"""SparaPLL baseline: cover property holds, minimality does not."""
import numpy as np
import pytest

from repro.core.parapll import spara_pll
from repro.core.query import QueryIndex
from tests.helpers import CORE_DATASETS, chl, dist_matrix, graph, rank_of


@pytest.mark.parametrize("name", CORE_DATASETS)
def test_cover_property_queries_exact(name):
    g = graph(name)
    store, _ = spara_pll(None, g, rank_of(name), p=16)
    idx = QueryIndex.from_store(store)
    D = dist_matrix(name)
    rng = np.random.default_rng(11)
    for _ in range(250):
        u, v = rng.integers(0, g.n, 2)
        assert idx.query(int(u), int(v)) == D[u][v]


@pytest.mark.parametrize("name", CORE_DATASETS)
def test_als_at_least_chl(name):
    store, _ = spara_pll(None, graph(name), rank_of(name), p=16)
    assert store.als() >= chl(name).als()


@pytest.mark.parametrize("name", ["CAL", "POK"])
def test_redundancy_grows_with_parallelism(name):
    """Paper §3: paraPLL label size increases with thread count."""
    g, rank = graph(name), rank_of(name)
    s_lo, _ = spara_pll(None, g, rank, p=2, max_batch=2)
    s_hi, _ = spara_pll(None, g, rank, p=64, max_batch=512)
    assert s_hi.num_labels() >= s_lo.num_labels()


def test_superset_of_chl_labels_not_guaranteed_minimal():
    name = "POK"
    store, _ = spara_pll(None, graph(name), rank_of(name), p=16)
    assert store.num_labels() > chl(name).num_labels()
