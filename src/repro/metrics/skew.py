"""Fisher-Pearson standardized moment coefficient, without scipy.

The paper (§4.1) cites this skewness measure [14] to characterize column
skew; scipy is not installed in the container, so tests use this numpy
implementation (g1 = m3 / m2^{3/2}).
"""
import numpy as np


def fisher_pearson_skew(values) -> float:
    v = np.asarray(values, dtype=float)
    v = v[np.isfinite(v)]
    m = v.mean()
    m2 = ((v - m) ** 2).mean()
    m3 = ((v - m) ** 3).mean()
    if m2 == 0:
        return 0.0
    return float(m3 / m2**1.5)
