"""§6 query modes: agreement, memory layout, routing, budget gating."""
import numpy as np
import pytest

from repro.core.labels import LABEL_BYTES
from repro.core.query import QueryIndex
from repro.dist.query_modes import (
    evaluate_query_modes,
    qdol_indices,
    qdol_node_of,
    shard_by_hub_owner,
    zeta_for,
)
from repro.synth_data import query_pairs
from tests.helpers import chl, dist_matrix, graph, rank_of


def test_zeta_values():
    # C(6,2)=15 ≤ 16; C(7,2)=21 > 16
    assert zeta_for(16) == 6
    assert zeta_for(64) == 11  # paper formula: (1+sqrt(513))/2 ≈ 11.8 → 11
    assert zeta_for(2) == 2


def test_qdol_node_of():
    z = 4
    assert qdol_node_of(1, 3, z) == (1, 3)
    assert qdol_node_of(3, 1, z) == (1, 3)
    assert qdol_node_of(2, 2, z) == (2, 3)
    assert qdol_node_of(3, 3, z) == (0, 3)  # wraps


@pytest.mark.parametrize("name", ["CAL", "SKIT", "POK"])
@pytest.mark.parametrize("q", [4, 16])
def test_all_modes_agree_and_match_truth(name, q):
    g = graph(name)
    pairs = query_pairs(n=g.n, n_queries=250, seed=q).values
    res = evaluate_query_modes(None, chl(name), rank_of(name), q, pairs)
    D = dist_matrix(name)
    truth = np.array([D[u][v] for u, v in pairs])
    for mode in ("QLSN", "QFDL", "QDOL"):
        assert res[mode]["supported"]
        assert np.array_equal(res[mode]["answers"], truth), mode


def test_qfdl_shards_partition_labels():
    name, q = "SKIT", 5
    store = chl(name)
    shards = shard_by_hub_owner(store, rank_of(name), q)
    assert sum(s.num_labels() for s in shards) == store.num_labels()
    # a hub's labels all land on one shard
    n = store.n
    rank = rank_of(name)
    for i, s in enumerate(shards):
        for v in range(n):
            for h in s.hubs[v]:
                assert int(n - 1 - rank[h]) % q == i


def test_qdol_pairs_cover_all_partitions():
    name, q = "CAL", 16
    zeta, nodes = qdol_indices(chl(name), q)
    assert len(nodes) == zeta * (zeta - 1) // 2 <= q
    # node (i,j) holds exactly labels of vertices in partitions i and j
    for (i, j), idx in nodes.items():
        for v in range(idx.n):
            if len(idx.hubs[v]):
                assert v % zeta in (i, j)


def test_memory_model_relations():
    """Paper §6: QLSN total = q×L; QFDL total = L; QDOL total ≈ 2q/ζ × L."""
    name, q = "POK", 16
    store = chl(name)
    res = evaluate_query_modes(
        None, store, rank_of(name), q, query_pairs(n=store.n, n_queries=50).values
    )
    L = store.num_labels() * LABEL_BYTES
    assert res["QLSN"]["mem_total_bytes"] == q * L
    assert res["QFDL"]["mem_total_bytes"] == L
    zeta = res["QDOL"]["zeta"]
    assert res["QDOL"]["mem_total_bytes"] == pytest.approx(2 * L * len(
        [1 for i in range(zeta) for j in range(i + 1, zeta)]
    ) / zeta, rel=0.35)
    # ordering: QFDL < QDOL < QLSN (paper Table 4)
    assert (
        res["QFDL"]["mem_total_bytes"]
        < res["QDOL"]["mem_total_bytes"]
        < res["QLSN"]["mem_total_bytes"]
    )


def test_budget_gates_modes():
    """Table 4's '-' rows: per-node budget disables QLSN first."""
    name, q = "POK", 16
    store = chl(name)
    full = store.num_labels() * LABEL_BYTES
    res = evaluate_query_modes(
        None,
        store,
        rank_of(name),
        q,
        query_pairs(n=store.n, n_queries=20).values,
        node_budget_bytes=full // 2,
    )
    assert not res["QLSN"]["supported"]
    assert res["QFDL"]["supported"]
    assert "answers" not in res["QLSN"]


def test_latency_model_ordering():
    """Network model keeps the paper's latency ordering QLSN < QDOL < QFDL
    when per-query compute is comparable."""
    name, q = "SKIT", 16
    res = evaluate_query_modes(
        None, chl(name), rank_of(name), q,
        query_pairs(n=graph(name).n, n_queries=200).values,
    )
    assert res["QLSN"]["latency_s"] < res["QFDL"]["latency_s"]
    assert res["QDOL"]["latency_s"] < res["QFDL"]["latency_s"]
