"""Shared machinery for the §5 distributed algorithms.

Node model (paper §5.1): every node holds the full graph and ranking
(replicated at load time, not metered); the *label set is partitioned* —
node i owns exactly the labels whose hub it constructed, with roots
assigned circularly by rank (owner of the j-th ranked root is j mod q).
A node's pruning view is therefore its own shard (+ the replicated
Common Label Table), which is what makes DGLL chatty and PLaNT silent.

The superstep functions below run inside SimCluster (RDD partitions or
the serial fallback) and are deliberately free of driver state: all
inputs arrive via the ctx broadcast (graph, rank, root order) or the
superstep payload.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.core.dijkstra import prune_dij_rq
from repro.core.labels import CommonLabelTable, LabelStore
from repro.core.parallel import dq_clean
from repro.core.plant import plant_dijkstra
from repro.graphs.csr import CSRGraph
from repro.graphs.ranking import roots_by_rank


class OOMError(RuntimeError):
    """A simulated node exceeded its main-memory budget (paper's '-' rows)."""


@dataclass
class NodeState:
    """One cluster node: its label shard, common table, and counters."""

    store: LabelStore
    common: CommonLabelTable | None = None
    local: list = field(default_factory=list)  # (gidx, v, hub, dist) this superstep
    work_s: float = 0.0  # accumulated tree-construction compute
    explored: int = 0  # Dijkstra settles (Ψ numerator)
    labels_built: int = 0

    def mem_bytes(self) -> int:
        c = self.common.bytes() if self.common is not None else 0
        return self.store.bytes() + c


def make_ctx(spark: SparkSession | None, g: CSRGraph, rank: np.ndarray):
    """(get, free): get() -> (graph, rank, root_order), broadcast once."""
    order = roots_by_rank(rank)
    if spark is None:
        val = (g, rank, order)
        return (lambda: val), (lambda: None)
    bc = spark.sparkContext.broadcast((g, rank, order))
    return (lambda: bc.value), bc.unpersist


def my_roots(order: np.ndarray, pos: int, x: int, q: int, node_id: int):
    """Circular task assignment: node j mod q owns the j-th ranked root."""
    end = min(pos + x, len(order))
    return [(j, int(order[j])) for j in range(pos, end) if j % q == node_id]


# --------------------------------------------------------------------- #
# Superstep functions (run on nodes).
# --------------------------------------------------------------------- #
def construct_fn(get, engine: str, emit: str = "all", top_hubs: frozenset | None = None):
    """Build this node's trees for the superstep's rank window.

    engine='dgll': pruned Dijkstra with rank queries against the node's
    own shard (+ common table). engine='plant': PLaNTed trees (+ common
    table pruning). New labels go into the node's shard immediately
    (visible to its own later trees, like GLL's local table) and are also
    reported back for the cleaning round.
    """

    def fn(node_id, st: NodeState, payload):
        g, rank, order = get()
        pos, x, q = payload["pos"], payload["x"], payload["q"]
        roots = my_roots(order, pos, x, q, node_id)
        new: list = []
        explored_window = 0
        t0 = time.perf_counter()
        for _, root in roots:
            if engine == "plant":
                labels, explored = plant_dijkstra(g, rank, root, common=st.common)
                explored_window += explored
            else:
                labels = prune_dij_rq(g, rank, root, st.store, common=st.common)
                explored_window += len(labels)
            st.store.commit([(v, root, d) for v, d in labels], rank)
            new.extend((v, root, d) for v, d in labels)
        st.explored += explored_window
        st.work_s += time.perf_counter() - t0
        st.labels_built += len(new)
        st.local = new
        # emit='all': cleaning round needs every new label centrally.
        # emit='top': only Common-Label-Table hubs leave the node (§5.3).
        # emit='none': pure PLaNT — labels never leave the generating node.
        if emit == "all":
            shipped = new
        elif emit == "top":
            shipped = [(v, h, d) for v, h, d in new if h in top_hubs]
        else:
            shipped = []
        return st, {
            "new": shipped,
            "n_labels": len(new),
            "n_trees": len(roots),
            "explored": st.explored,
            "explored_window": explored_window,
        }

    return fn


def clean_fn(get):
    """Answer DQ_Clean for every broadcast candidate using this node's shard.

    Returns the candidate indices this node can prove redundant; the
    driver ORs the per-node sets (the paper's bitvector all-reduce).
    """

    def fn(node_id, st: NodeState, payload):
        g, rank, order = get()
        hubs, dists = st.store.hubs, st.store.dists
        redundant = []
        for v, h, delta in payload:
            if v == h:
                continue
            if dq_clean(hubs[v], dists[v], hubs[h], dists[h], h, delta, rank):
                redundant.append((v, h))
        return st, redundant

    return fn


def apply_fn(get, budget_bytes: int | None):
    """Drop redundant labels from the owner shard; install common updates."""

    def fn(node_id, st: NodeState, payload):
        g, rank, order = get()
        doomed = payload["doomed"]  # global (v, hub) set; shards only hold
        if doomed:  # their own hubs, so foreign pairs are no-ops
            st.store.delete(doomed)
        st.local = []
        if st.common is not None:
            for hub, labels in payload["common_updates"]:
                st.common.add_hub_labels(hub, labels)
        mem = st.mem_bytes()
        return st, {"mem": mem, "oom": budget_bytes is not None and mem > budget_bytes}

    return fn


def install_common_fn(get):
    """Install broadcast top-η hub label sets into every node's common table."""

    def fn(node_id, st: NodeState, payload):
        for hub, labels in payload:
            st.common.add_hub_labels(hub, labels)
        return st, None

    return fn


# --------------------------------------------------------------------- #
# Driver-side helpers.
# --------------------------------------------------------------------- #
def superstep_sizes(n: int, x1: int, beta: float, cap: int | None = None):
    """β-growing rank windows covering [0, n) (paper §5.1 optimisation 2).

    ``cap`` bounds the window width — the Hybrid's PLaNT phase uses it so
    the Ψ switch check gets enough checkpoints before the tail is gone.
    """
    out, pos, x = [], 0, max(1, x1)
    while pos < n:
        w = min(int(x), n - pos)
        if cap is not None:
            w = min(w, cap)
        out.append((pos, w))
        pos += w
        x *= beta
    return out


def collect_store(cluster, n: int, rank: np.ndarray) -> LabelStore:
    """Assemble the partitioned labeling into one store (test/query path;
    not metered — the paper never materialises this during construction)."""
    shards = cluster.map_states(lambda i, st: st.store.triplets())
    store = LabelStore(n)
    for t in shards.values():
        store.commit(t, rank)
    return store


def cluster_stats(cluster) -> dict:
    per_node = cluster.map_states(
        lambda i, st: {
            "work_s": st.work_s,
            "mem": st.mem_bytes(),
            "labels": st.store.num_labels(),
            "explored": st.explored,
        }
    )
    return {
        "work_makespan_s": max(v["work_s"] for v in per_node.values()),
        "work_total_s": sum(v["work_s"] for v in per_node.values()),
        "mem_max_node": max(v["mem"] for v in per_node.values()),
        "labels_total": sum(v["labels"] for v in per_node.values()),
        "explored_total": sum(v["explored"] for v in per_node.values()),
        "comm": cluster.comm.as_dict(),
    }
