"""Spark fan-out primitives shared by the parallel labeling algorithms.

A *batch* of SPT roots is the unit of optimistic parallelism: every tree
in a batch prunes against the same frozen label snapshot (what the
committed global table held when the batch launched), exactly the
mistake mode LCC/GLL are designed to correct (DESIGN.md §2). The graph
and the snapshot travel to executors as broadcast variables; results
come back as plain (root, labels) lists.

All helpers accept ``spark=None`` to run the identical computation
serially on the driver — unit tests use that path; integration tests and
benchmarks use Spark.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.core.dijkstra import prune_dij_rq
from repro.core.labels import CommonLabelTable, LabelStore
from repro.graphs.csr import CSRGraph


def _n_slices(spark: SparkSession, n_items: int) -> int:
    return max(1, min(n_items, spark.sparkContext.defaultParallelism * 2))


def build_trees(
    spark: SparkSession | None,
    g: CSRGraph,
    rank: np.ndarray,
    roots,
    visible: LabelStore,
    *,
    use_rank_queries: bool = True,
    common: CommonLabelTable | None = None,
) -> list[tuple[int, list[tuple[int, int]]]]:
    """Construct pruned SPTs for ``roots`` against a frozen ``visible`` snapshot.

    Returns [(root, [(v, dist), ...])], in ``roots`` order.
    """
    roots = [int(r) for r in roots]
    if spark is None:
        return [
            (r, prune_dij_rq(g, rank, r, visible, use_rank_queries=use_rank_queries, common=common))
            for r in roots
        ]
    sc = spark.sparkContext
    g_bc, rank_bc, vis_bc = sc.broadcast(g), sc.broadcast(rank), sc.broadcast(visible)
    common_bc = sc.broadcast(common)
    urq = use_rank_queries
    try:
        res = (
            sc.parallelize(roots, _n_slices(spark, len(roots)))
            .map(
                lambda r: (
                    r,
                    prune_dij_rq(
                        g_bc.value,
                        rank_bc.value,
                        r,
                        vis_bc.value,
                        use_rank_queries=urq,
                        common=common_bc.value,
                    ),
                )
            )
            .collect()
        )
    finally:
        for b in (g_bc, rank_bc, vis_bc, common_bc):
            b.unpersist()
    order = {r: i for i, r in enumerate(roots)}
    res.sort(key=lambda t: order[t[0]])
    return res


def dq_clean(
    hubs_v, dists_v, hubs_h, dists_h, h: int, delta: int, rank: np.ndarray
) -> bool:
    """Alg. 2's DQ_Clean: is label (h, delta) of v redundant?

    True iff some common hub w of L_v and L_h with R(w) > R(h) satisfies
    d(v,w) + d(h,w) ≤ delta. Both label lists are sorted by decreasing
    hub rank, so a two-pointer merge stops as soon as ranks fall to R(h)
    (the paper's footnote-3 early exit).
    """
    rh = rank[h]
    i = j = 0
    nv, nh = len(hubs_v), len(hubs_h)
    while i < nv and j < nh:
        wv, wh = hubs_v[i], hubs_h[j]
        rv, rw = rank[wv], rank[wh]
        if rv <= rh or rw <= rh:
            return False
        if wv == wh:
            if dists_v[i] + dists_h[j] <= delta:
                return True
            i += 1
            j += 1
        elif rv > rw:
            i += 1
        else:
            j += 1
    return False


def _eval_clean_chunk(chunk, witness: LabelStore, rank: np.ndarray):
    """Redundant subset of a chunk of (v, h, delta) candidates."""
    out = []
    hubs, dists = witness.hubs, witness.dists
    for v, h, delta in chunk:
        if v == h:
            continue  # self-labels are never redundant
        if dq_clean(hubs[v], dists[v], hubs[h], dists[h], h, delta, rank):
            out.append((v, h))
    return out


def find_redundant(
    spark: SparkSession | None,
    witness: LabelStore,
    candidates: list[tuple[int, int, int]],
    rank: np.ndarray,
) -> set[tuple[int, int]]:
    """Run DQ_Clean over candidate labels; returns the redundant (v, h) set.

    ``witness`` is the label table searched for covering hubs. LCC passes
    the full store; GLL passes only the current superstep's local table —
    a surviving label cannot be made redundant by an already-committed
    hub (the construction-time distance query would have pruned it), so
    restricting witnesses to same-superstep hubs is exact and is what
    drops GLL's cleaning complexity to O(n·α²) per superstep (paper §4.2).
    """
    if not candidates:
        return set()
    # A Spark round-trip costs ~0.3 s; small cleaning rounds (GLL's whole
    # point is that they are small) run on the driver, LCC-sized fan out.
    if spark is None or len(candidates) < 50_000:
        return set(_eval_clean_chunk(candidates, witness, rank))
    sc = spark.sparkContext
    store_bc, rank_bc = sc.broadcast(witness), sc.broadcast(rank)
    k = _n_slices(spark, len(candidates))
    chunks = [candidates[i::k] for i in range(k)]
    try:
        res = (
            sc.parallelize(chunks, k)
            .flatMap(lambda ch: _eval_clean_chunk(ch, store_bc.value, rank_bc.value))
            .collect()
        )
    finally:
        store_bc.unpersist()
        rank_bc.unpersist()
    return set(res)
