"""The FEDEX algorithm: step model, interestingness, partitions,
contribution, skyline, and the Algorithm-1 orchestrator."""
from repro.core.explain import Explanation, Fedex, FedexConfig
from repro.core.model import (
    Aggregation,
    FilterStep,
    GroupByStep,
    JoinStep,
    Step,
    UnionStep,
)

__all__ = [
    "Aggregation",
    "Explanation",
    "Fedex",
    "FedexConfig",
    "FilterStep",
    "GroupByStep",
    "JoinStep",
    "Step",
    "UnionStep",
]
