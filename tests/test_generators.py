"""Dataset-suite tests (paper Table 2 analogues)."""
import numpy as np
import pytest

from repro.core.dijkstra import reference_dijkstra
from repro.core.labels import INF
from repro.graphs.generators import DATASETS, ROAD, build_dataset, is_road
from tests.helpers import TEST_SCALE

ALL = sorted(DATASETS)


def test_twelve_datasets():
    assert len(DATASETS) == 12
    assert set(ROAD) <= set(DATASETS)


@pytest.mark.parametrize("name", ALL)
def test_deterministic(name):
    a = build_dataset(name, TEST_SCALE)
    b = build_dataset(name, TEST_SCALE)
    assert np.array_equal(a.indices, b.indices)
    assert np.array_equal(a.weights, b.weights)


@pytest.mark.parametrize("name", ALL)
def test_size_scales(name):
    small = build_dataset(name, 0.05)
    big = build_dataset(name, 0.2)
    assert big.n > small.n
    assert big.m > small.m


@pytest.mark.parametrize("name", ALL)
def test_connected(name):
    g = build_dataset(name, TEST_SCALE)
    dist = reference_dijkstra(g, 0)
    assert (dist < INF).all(), f"{name} analogue must be connected"


@pytest.mark.parametrize("name", ALL)
def test_weights_positive_ints(name):
    g = build_dataset(name, TEST_SCALE)
    assert g.weights.dtype == np.int64
    assert (g.weights >= 1).all()


@pytest.mark.parametrize("name", sorted(set(ALL) - set(ROAD)))
def test_scale_free_weight_range(name):
    # paper: weights uniform in [1, sqrt(n)) for (originally unweighted) graphs
    g = build_dataset(name, 1.0)
    assert g.weights.max() < np.sqrt(g.n)


@pytest.mark.parametrize("name", ROAD)
def test_road_weight_range(name):
    g = build_dataset(name, TEST_SCALE)
    assert g.weights.max() <= 10


@pytest.mark.parametrize("name", ALL)
def test_average_degree_near_spec(name):
    spec = DATASETS[name]
    g = build_dataset(name, 1.0)
    avg = 2 * g.m / g.n
    assert 0.5 * spec.deg <= avg <= 2.6 * spec.deg


@pytest.mark.parametrize("name", ["SKIT", "ACT", "YTB"])
def test_scale_free_has_hubs(name):
    # preferential attachment must produce a heavy tail: max degree >> mean
    g = build_dataset(name, 1.0)
    deg = g.degrees()
    assert deg.max() > 5 * deg.mean()


@pytest.mark.parametrize("name", ROAD)
def test_road_is_flat_degree(name):
    g = build_dataset(name, 1.0)
    deg = g.degrees()
    assert deg.max() <= 8  # grid + diagonals: bounded degree


def test_is_road():
    assert is_road("CAL") and not is_road("SKIT")


@pytest.mark.parametrize("name", ALL)
def test_paper_sizes_recorded(name):
    spec = DATASETS[name]
    assert spec.paper_n > 1e5 and spec.paper_m > spec.paper_n


def test_road_higher_diameter_than_scalefree():
    road = build_dataset("CAL", TEST_SCALE)
    sf = build_dataset("SKIT", TEST_SCALE)
    # unweighted hop eccentricity from vertex 0 as a cheap diameter proxy
    def hops(g):
        unit = g
        unit.weights = np.ones_like(g.weights)
        return reference_dijkstra(unit, 0).max()

    assert hops(road) > hops(sf)
