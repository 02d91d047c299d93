"""Benchmark behind Table 3: shared-memory labeling algorithms.

One benchmark per (dataset, algorithm). Scales are reduced vs jobs/ so
the whole suite stays in minutes; the jobs/table3_shared_memory.py
harness regenerates the full 12-dataset table. ALS and cleaning split
are attached as extra_info so the benchmark JSON carries the paper's
non-time columns too.
"""
import pytest

from repro.core.gll import gll
from repro.core.lcc import lcc
from repro.core.parapll import spara_pll
from repro.core.pll import seq_pll
from repro.graphs.generators import DATASETS, build_dataset
from repro.graphs.ranking import rank_for

#: (dataset, scale): one road, one scale-free, one weak-hierarchy outlier.
CASES = [("CAL", 0.5), ("SKIT", 1.0), ("ACT", 0.5), ("POK", 0.4)]


def _setup(name, scale):
    g = build_dataset(name, scale)
    return g, rank_for(g, DATASETS[name].kind)


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_seqpll(benchmark, name, scale):
    g, rank = _setup(name, scale)
    store, stats = benchmark.pedantic(
        lambda: seq_pll(g, rank), rounds=1, iterations=1
    )
    benchmark.extra_info["als"] = round(store.als(), 2)
    benchmark.extra_info["dataset"] = name


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_lcc(benchmark, spark, name, scale):
    g, rank = _setup(name, scale)
    store, stats = benchmark.pedantic(
        lambda: lcc(spark, g, rank, p=16), rounds=1, iterations=1
    )
    benchmark.extra_info["als"] = round(store.als(), 2)
    benchmark.extra_info["clean_s"] = round(stats["time_clean"], 3)


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_gll(benchmark, spark, name, scale):
    g, rank = _setup(name, scale)
    store, stats = benchmark.pedantic(
        lambda: gll(spark, g, rank, p=16, alpha=4.0), rounds=1, iterations=1
    )
    benchmark.extra_info["als"] = round(store.als(), 2)
    benchmark.extra_info["clean_s"] = round(stats["time_clean"], 3)
    benchmark.extra_info["supersteps"] = stats["supersteps"]


@pytest.mark.parametrize("name,scale", CASES)
def test_bench_sparapll(benchmark, spark, name, scale):
    g, rank = _setup(name, scale)
    store, _ = benchmark.pedantic(
        lambda: spara_pll(spark, g, rank, p=16), rounds=1, iterations=1
    )
    benchmark.extra_info["als"] = round(store.als(), 2)  # > CHL ALS (Table 3)
