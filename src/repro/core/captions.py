"""Natural-language captions for explanations (paper §3.7).

The paper renders each skyline explanation as a captioned plot; figures
are out of scope here, so the caption templates carry the full message:

* exceptionality (filter/join/union): the set's share of rows before vs
  after the operation, in percentages and multiples — Fig. 2a's "61% of
  the popular songs, compared to only 3.5% in the entire dataset".
* diversity (group-by): how far the set's mean aggregate value sits from
  the overall mean, in standard deviations — Fig. 2b's "songs made in the
  90s tend to be less loud than later songs".

The set label is chosen per partition method exactly as §3.7 describes:
interval endpoints for numeric partitions, the B-value for many-to-one,
the value itself for frequency partitions (handled upstream: the label is
stored on the partition).
"""
from __future__ import annotations


def _pct(x: float) -> str:
    return f"{100.0 * x:.1f}%"


def _set_phrase(method: str, attr: str, via: str | None, label: str) -> str:
    if method == "numeric":
        return f"rows with '{attr}' in {label}"
    if method == "many_to_one":
        return f"rows where '{via}' = '{label}' (grouping '{attr}')"
    return f"rows where '{attr}' = '{label}'"


def exceptionality_caption(
    *,
    op: str,
    column: str,
    attr: str,
    method: str,
    via: str | None,
    label: str,
    share_in: float,
    share_out: float,
    interestingness: float,
    std_contribution: float,
) -> str:
    """Caption for a KS-based explanation (cf. Fig. 2a)."""
    subject = _set_phrase(method, attr, via, label)
    if share_in > 0 and share_out >= share_in:
        ratio = share_out / share_in
        direction = f"{ratio:.1f}x more frequent after the {op}"
    elif share_out > 0 and share_in > share_out:
        ratio = share_in / share_out
        direction = f"{ratio:.1f}x less frequent after the {op}"
    else:
        direction = f"exclusive to one side of the {op}"
    return (
        f"The {op} changed the distribution of column '{column}' "
        f"(KS deviation {interestingness:.2f}). Most of that deviation is "
        f"driven by {subject}: they form {_pct(share_out)} of the result "
        f"vs {_pct(share_in)} of the input — {direction} "
        f"(standardized contribution {std_contribution:.2f})."
    )


def diversity_caption(
    *,
    column: str,
    attr: str,
    method: str,
    via: str | None,
    label: str,
    set_mean: float,
    overall_mean: float,
    overall_std: float,
    interestingness: float,
    std_contribution: float,
) -> str:
    """Caption for a CV-based explanation (cf. Fig. 2b)."""
    subject = _set_phrase(method, attr, via, label)
    if overall_std and overall_std == overall_std:  # not NaN / zero
        sigmas = (set_mean - overall_mean) / overall_std
        rel = (
            f"{abs(sigmas):.1f} standard deviations "
            f"{'above' if sigmas >= 0 else 'below'} the overall mean "
            f"{overall_mean:.2f}"
        )
    else:
        rel = f"compared to the overall mean {overall_mean:.2f}"
    return (
        f"Column '{column}' shows highly diverse group values "
        f"(CV {interestingness:.2f}). The diversity is driven mainly by "
        f"{subject}, whose groups average {set_mean:.2f} — {rel} "
        f"(standardized contribution {std_contribution:.2f})."
    )
