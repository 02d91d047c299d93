"""SparaPLL baseline (Qiu et al., paper §3).

Concurrent pruned Dijkstras over a rank-ordered task queue with distance
queries only — no rank queries, no cleaning. The labeling satisfies the
cover property (queries are exact) but is *not* canonical: redundant
labels survive, and their count grows with the degree of parallelism,
which is the ALS gap Table 3 and Fig. 9 report.
"""
from __future__ import annotations

from repro.core.gll import construct_and_clean


def spara_pll(spark, g, rank, *, p=16, max_batch=512, deadline_s=None):
    """Shared-memory paraPLL: DQ-only pruning, redundant labels kept."""
    return construct_and_clean(
        spark,
        g,
        rank,
        p=p,
        alpha=None,
        clean=False,
        use_rank_queries=False,
        max_batch=max_batch,
        deadline_s=deadline_s,
    )
