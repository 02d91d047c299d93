"""DparaPLL baseline (paper §3/§7): distributed paraPLL.

Roots are statically split across nodes in rank-circular order; every
node runs SparaPLL (distance queries only, no rank queries) on its queue
and — unlike DGLL — keeps a *full replica* of all labels: at each of the
~log₈ n equal-sized synchronisations, every node's new labels are
broadcast and merged into every replica. That gives the paper's two
failure modes, which we meter and model:

* label-size explosion with q (no rank queries, stale pruning views);
* per-node memory = the entire labeling → OOM on large graphs.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.core.dijkstra import prune_dij_rq
from repro.core.labels import LabelStore
from repro.dist.cluster import SimCluster
from repro.dist.dgll import DistResult
from repro.dist.engine import OOMError, make_ctx, my_roots
from repro.graphs.csr import CSRGraph


@dataclass
class ReplicaState:
    """A DparaPLL node: full label replica + this superstep's additions."""

    replica: LabelStore
    work_s: float = 0.0
    labels_built: int = 0


def dpara_pll(
    spark: SparkSession | None,
    g: CSRGraph,
    rank: np.ndarray,
    q: int,
    *,
    n_syncs: int | None = None,
    budget_bytes: int | None = None,
    deadline_s: float | None = None,
    collect: bool = True,
) -> DistResult:
    """Run DparaPLL on ``q`` nodes; raises OOMError over ``budget_bytes``."""
    t0 = time.perf_counter()
    n = g.n
    if n_syncs is None:
        n_syncs = max(1, round(math.log(max(2, n)) / math.log(8)))
    step = max(1, math.ceil(n / n_syncs))  # equal supersteps, unlike DGLL
    get, free = make_ctx(spark, g, rank)

    def init_fn(i):
        return ReplicaState(replica=LabelStore(n))

    def build_fn(node_id, st: ReplicaState, payload):
        gr, rk, order = get()
        pos, x = payload["pos"], payload["x"]
        new = []
        t_in = time.perf_counter()
        for gidx, root in my_roots(order, pos, x, q, node_id):
            labels = prune_dij_rq(
                gr, rk, root, st.replica, use_rank_queries=False
            )
            st.replica.commit([(v, root, d) for v, d in labels], rk)
            new.extend((v, root, d) for v, d in labels)
        st.work_s += time.perf_counter() - t_in
        st.labels_built += len(new)
        return st, new

    def merge_fn(node_id, st: ReplicaState, payload):
        gr, rk, order = get()
        others = [t for src, t in payload.items() if src != node_id]
        for triplets in others:
            st.replica.commit(triplets, rk)
        mem = st.replica.bytes()
        return st, {
            "mem": mem,
            "oom": budget_bytes is not None and mem > budget_bytes,
        }

    cluster = SimCluster(spark, q, init_fn)
    timed_out = False
    try:
        pos = 0
        while pos < n:
            if deadline_s is not None and time.perf_counter() - t0 > deadline_s:
                timed_out = True
                break
            outs = cluster.superstep(
                build_fn, {"pos": pos, "x": step}, broadcast_payload=False
            )
            cluster.gather(outs)
            mems = cluster.superstep(merge_fn, outs)  # full label exchange
            bad = [i for i, o in mems.items() if o["oom"]]
            if bad:
                raise OOMError(
                    f"DparaPLL replica exceeded {budget_bytes} bytes on "
                    f"node(s) {bad} (max {max(o['mem'] for o in mems.values())})"
                )
            pos += step
        per_node = cluster.map_states(
            lambda i, st: {
                "work_s": st.work_s,
                "mem": st.replica.bytes(),
                "labels": st.replica.num_labels(),
            }
        )
        stats = {
            "work_makespan_s": max(v["work_s"] for v in per_node.values()),
            "mem_max_node": max(v["mem"] for v in per_node.values()),
            "labels_total": per_node[0]["labels"],
            "comm": cluster.comm.as_dict(),
            "time_s": time.perf_counter() - t0,
            "timed_out": timed_out,
            "supersteps": n_syncs,
            "als": per_node[0]["labels"] / n,
        }
        store = None
        if collect:
            shards = cluster.map_states(
                lambda i, st: st.replica.triplets() if i == 0 else None
            )
            store = LabelStore.from_triplets(n, shards[0], rank)
        return DistResult(store, stats)
    finally:
        cluster.free()
        free()
