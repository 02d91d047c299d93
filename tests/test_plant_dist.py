"""Distributed PLaNT: canonical output with zero label traffic."""
import pytest

from repro.core.reference import brute_chl
from repro.dist.plant_dist import plant_dist
from tests.helpers import (
    CORE_DATASETS,
    chl_set,
    graph,
    random_connected_graph,
    random_rank,
    rank_of,
)


@pytest.mark.parametrize("name", CORE_DATASETS)
@pytest.mark.parametrize("q", [1, 4, 8])
def test_plant_dist_equals_chl(name, q):
    r = plant_dist(None, graph(name), rank_of(name), q=q)
    assert r.store.canonical_set() == chl_set(name)


@pytest.mark.parametrize("name", CORE_DATASETS)
def test_zero_communication(name):
    r = plant_dist(None, graph(name), rank_of(name), q=8)
    assert r.stats["comm"]["total_bytes"] == 0
    assert r.stats["comm"]["n_syncs"] == 0


@pytest.mark.parametrize("seed", range(3))
def test_plant_dist_random(seed):
    g = random_connected_graph(35, 30, 5, seed=seed)
    rank = random_rank(35, seed + 3)
    r = plant_dist(None, g, rank, q=4)
    assert r.store.canonical_set() == brute_chl(g, rank).canonical_set()


def test_eta_common_table_only_traffic():
    """With η top hubs replicated, comm is exactly the top-hub labels."""
    name = "CAL"
    r = plant_dist(None, graph(name), rank_of(name), q=4, eta=8)
    assert r.store.canonical_set() == chl_set(name)
    c = r.stats["comm"]
    assert 0 < c["total_bytes"]
    # traffic is bounded by ~η·n labels, far below the full label set
    full = plant_dist(None, graph(name), rank_of(name), q=4)
    assert c["gather_bytes"] < full.stats["labels_total"] * 8


def test_eta_reduces_exploration():
    name = "CAL"
    plain = plant_dist(None, graph(name), rank_of(name), q=4)
    pruned = plant_dist(None, graph(name), rank_of(name), q=4, eta=16)
    assert pruned.stats["explored_total"] < plain.stats["explored_total"]


def test_work_balanced_across_nodes():
    r = plant_dist(None, graph("EAS"), rank_of("EAS"), q=4)
    st = r.stats
    assert st["work_makespan_s"] <= st["work_total_s"]
    # circular assignment: makespan within a reasonable factor of mean
    assert st["work_makespan_s"] < 0.8 * st["work_total_s"]


def test_psi_recorded_per_window():
    r = plant_dist(None, graph("SKIT"), rank_of("SKIT"), q=2)
    psi = r.stats["psi_per_window"]
    assert len(psi) >= 2
    # Fig. 3 shape: last window's Ψ above the first window's
    assert psi[-1][2] > psi[0][2]
