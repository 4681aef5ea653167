"""Planted ground-truth insights for the simulated user studies.

The paper's §4.2 user studies grade explanations by human judges. Humans
are not computationally reproducible; because our datasets are synthetic
we instead *know* the true pattern behind every notebook query (the
generators plant them — see ``repro/datasets/*``), so a deterministic
judge can grade whether a method's explanation names the true pattern.
DESIGN.md §2 documents this substitution; EXPERIMENTS.md flags every
derived number as simulated.

A :class:`PlantedInsight` describes the true explanation of one workload
query as substring matchers: ``column_keys`` (any must appear in the
claimed column) and ``set_keys`` (any must appear in the claimed
set-of-rows label; ``None`` = the insight is column-level only).
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class PlantedInsight:
    query: int
    column_keys: tuple[str, ...]
    set_keys: tuple[str, ...] | None
    description: str
    #: True when the pattern is blatant in the raw output dataframe (the
    #: unassisted-analyst model can spot it without tooling) — see
    #: ``unassisted.py``.
    obvious_in_output: bool = False
    #: True when the insight is *comparative* — a statement about how the
    #: operation changed a distribution (all exceptionality/filter/join
    #: insights). A method that analyzes only the output view (RATH) can
    #: name the pattern but not the change, and earns at most
    #: column-level credit on these (judge.py). Group-by diversity
    #: insights are static properties of the output, where output-only
    #: methods compete on equal footing.
    comparative: bool = False


#: The true insight(s) per §4.2 notebook query. Multiple entries per
#: query = several acceptable true explanations.
INSIGHTS: list[PlantedInsight] = [
    # ---- Spotify notebook (queries 6, 7, 21, 22) ---------------------
    PlantedInsight(
        6, ("decade", "year"), ("2010", "201", "202"),
        "2010s songs dominate the popularity>65 result (planted lift)",
        obvious_in_output=True,  # 61% of the filtered rows are 2010s
        comparative=True,
    ),
    PlantedInsight(
        7, ("decade", "year"), ("199", "200", "201", "202"),
        "the >1990 filter shifts the year/decade distribution",
        obvious_in_output=True,
        comparative=True,
    ),
    PlantedInsight(
        21, ("pop",), ("201", "202"),
        "popularity-by-year diversity is driven by the lifted 2010s",
    ),
    PlantedInsight(
        22, ("dance",), ("202",),
        "danceability-by-year diversity is driven by the 2020s lift",
    ),
    PlantedInsight(
        22, ("instr",), ("195", "196"),
        "pre-1970 songs are far more instrumental (planted era effect)",
    ),
    # ---- Bank notebook (queries 11, 12, 13, 27) ----------------------
    PlantedInsight(
        11,
        (
            "Months_Inactive", "Total_Trans_Ct", "Contacts_Count",
            "Total_Revolving_Bal", "Credit_Used", "Total_Count_Change",
            "Total_Transitions_Amount",
        ),
        None,
        "churners are planted to be inactive / low-transacting",
        # Browsing the all-churners view exposes one coarse pattern to an
        # unassisted analyst (paper Fig. 5: bank unassisted ≈ 1 insight).
        obvious_in_output=True,
        comparative=True,
    ),
    PlantedInsight(
        12,
        ("Months_Inactive", "Total_Trans_Ct", "Contacts_Count", "Total_Count_Change"),
        None,
        "high-recovery churners still show the planted inactivity drivers",
        comparative=True,
    ),
    PlantedInsight(
        13, ("Attrition_Flag", "Total_Trans_Ct", "Contacts_Count"), ("Attrited",),
        "high inactivity selects planted churners",
        comparative=True,
    ),
    PlantedInsight(
        27, ("cnt",), ("Married", "Single", "Graduate", "F", "M"),
        "group counts are dominated by the frequent demographic segments",
        obvious_in_output=True,
    ),
    # ---- Products notebook (queries 1, 5, 16, 17, 18) ----------------
    PlantedInsight(
        1, ("products_", "sales_"), None,
        "the join shifts product-attribute distributions (dead products "
        "+ Zipf sales)",
        comparative=True,
    ),
    PlantedInsight(
        5, ("pack", "vendor"), None,
        "pack=12 collapses the pack-related columns / vendor mix",
        obvious_in_output=True,
        comparative=True,
    ),
    PlantedInsight(
        16, ("count_item",), ("1", "2", "3"),
        "sales counts per vendor are Zipf — the head vendors drive diversity",
        obvious_in_output=True,
    ),
    PlantedInsight(
        17, ("count_item",), ("1", "2", "3", "Whiskey", "Vodka"),
        "county x category counts are dominated by head counties/categories",
    ),
    PlantedInsight(
        18, ("count_item",), ("6", "12"),
        "per-pack sales counts are dominated by the common 6/12 packs",
    ),
]


def insights_for(query: int) -> list[PlantedInsight]:
    return [gt for gt in INSIGHTS if gt.query == query]
