"""LCC — Label Construction and Cleaning (paper §4.1, Alg. 2).

Optimistic parallel construction with rank + distance queries, then one
cleaning pass that runs DQ_Clean over *every* generated label. Same
engine as GLL with ``alpha=None``; the cost difference between the two
(LCC re-queries labels GLL already consulted) is what Table 3 and Fig. 7
measure.
"""
from __future__ import annotations

from repro.core.gll import construct_and_clean


def lcc(spark, g, rank, *, p=16, deadline_s=None):
    """Two-phase LCC: construct everything, then clean everything once."""
    return construct_and_clean(
        spark, g, rank, p=p, alpha=None, clean=True, deadline_s=deadline_s
    )
