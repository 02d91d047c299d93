"""Benchmark behind Table 4: batch query throughput per §6 mode.

The benchmark time is the batch wall-clock (the throughput denominator);
per-mode modelled latency and measured memory land in extra_info.
"""
import numpy as np
import pytest

from repro.core.pll import seq_pll
from repro.dist.query_modes import (
    answer_qdol,
    answer_qfdl,
    answer_qlsn,
    qdol_indices,
    shard_by_hub_owner,
)
from repro.core.query import QueryIndex
from repro.graphs.generators import DATASETS, build_dataset
from repro.graphs.ranking import rank_for
from repro.synth_data import query_pairs

Q = 16
N_QUERIES = 20_000
CASES = [("CAL", 0.5), ("ACT", 0.5)]


def _setup(name, scale):
    g = build_dataset(name, scale)
    rank = rank_for(g, DATASETS[name].kind)
    store, _ = seq_pll(g, rank)
    pairs = query_pairs(n=g.n, n_queries=N_QUERIES).values
    return g, rank, store, pairs


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_qlsn(benchmark, spark, name, scale):
    g, rank, store, pairs = _setup(name, scale)
    idx = QueryIndex.from_store(store)
    ans = benchmark.pedantic(
        lambda: answer_qlsn(spark, idx, pairs), rounds=1, iterations=1
    )
    benchmark.extra_info["mem_total_bytes"] = idx.bytes() * Q
    benchmark.extra_info["n_queries"] = len(pairs)


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_qfdl(benchmark, spark, name, scale):
    g, rank, store, pairs = _setup(name, scale)
    shards = shard_by_hub_owner(store, rank, Q)
    benchmark.pedantic(
        lambda: answer_qfdl(spark, shards, pairs), rounds=1, iterations=1
    )
    benchmark.extra_info["mem_total_bytes"] = sum(s.bytes() for s in shards)
    benchmark.extra_info["n_queries"] = len(pairs)


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_qdol(benchmark, spark, name, scale):
    g, rank, store, pairs = _setup(name, scale)
    zeta, nodes = qdol_indices(store, Q)
    benchmark.pedantic(
        lambda: answer_qdol(spark, zeta, nodes, pairs), rounds=1, iterations=1
    )
    benchmark.extra_info["mem_total_bytes"] = sum(i.bytes() for i in nodes.values())
    benchmark.extra_info["n_queries"] = len(pairs)
