"""Benchmark behind the Fig. 8/9 supplementary scaling experiment.

Distributed algorithms at two cluster sizes on one road and one
scale-free analogue; communication volume and ALS in extra_info show
PLaNT's zero-traffic / DparaPLL's label-explosion contrast.
"""
import pytest

from repro.dist.dgll import dgll
from repro.dist.hybrid import hybrid
from repro.dist.parapll_dist import dpara_pll
from repro.dist.plant_dist import plant_dist
from repro.graphs.generators import DATASETS, build_dataset, is_road
from repro.graphs.ranking import rank_for

CASES = [("CAL", 0.5), ("SKIT", 0.7)]
QS = [2, 8]


def _setup(name, scale):
    g = build_dataset(name, scale)
    return g, rank_for(g, DATASETS[name].kind)


def _record(benchmark, res):
    benchmark.extra_info["als"] = round(res.stats["als"], 2)
    benchmark.extra_info["comm_bytes"] = res.stats["comm"]["total_bytes"]
    benchmark.extra_info["makespan_s"] = round(res.stats["work_makespan_s"], 3)


@pytest.mark.parametrize("name,scale", CASES)
@pytest.mark.parametrize("q", QS)
def test_bench_plant(benchmark, spark, name, scale, q):
    g, rank = _setup(name, scale)
    res = benchmark.pedantic(
        lambda: plant_dist(spark, g, rank, q, collect=False), rounds=1, iterations=1
    )
    _record(benchmark, res)


@pytest.mark.parametrize("name,scale", CASES)
@pytest.mark.parametrize("q", QS)
def test_bench_hybrid(benchmark, spark, name, scale, q):
    g, rank = _setup(name, scale)
    psi = 500.0 if is_road(name) else 100.0
    res = benchmark.pedantic(
        lambda: hybrid(spark, g, rank, q, psi_th=psi, collect=False),
        rounds=1,
        iterations=1,
    )
    _record(benchmark, res)


@pytest.mark.parametrize("name,scale", CASES)
@pytest.mark.parametrize("q", QS)
def test_bench_dgll(benchmark, spark, name, scale, q):
    g, rank = _setup(name, scale)
    res = benchmark.pedantic(
        lambda: dgll(spark, g, rank, q, collect=False), rounds=1, iterations=1
    )
    _record(benchmark, res)


@pytest.mark.parametrize("name,scale", CASES)
@pytest.mark.parametrize("q", QS)
def test_bench_dparapll(benchmark, spark, name, scale, q):
    g, rank = _setup(name, scale)
    res = benchmark.pedantic(
        lambda: dpara_pll(spark, g, rank, q, collect=False), rounds=1, iterations=1
    )
    benchmark.extra_info["als"] = round(res.stats["als"], 2)
    benchmark.extra_info["comm_bytes"] = res.stats["comm"]["total_bytes"]
