"""seqPLL correctness: label-for-label equality with brute-force CHL,
cover property, minimality, and the timeout model."""
import numpy as np
import pytest

from repro.core.labels import INF
from repro.core.pll import seq_pll
from repro.core.query import QueryIndex
from repro.core.reference import brute_chl
from repro.graphs.generators import DATASETS
from tests.helpers import (
    chl,
    chl_set,
    dist_matrix,
    graph,
    pll_store,
    random_connected_graph,
    random_rank,
    rank_of,
)

ALL = sorted(DATASETS)


@pytest.mark.parametrize("name", ALL)
def test_seqpll_equals_brute_chl(name):
    assert pll_store(name).canonical_set() == chl_set(name)


@pytest.mark.parametrize("name", ["CAL", "SKIT", "POK"])
def test_cover_property(name):
    """Every pair's query equals the true shortest distance."""
    g = graph(name)
    idx = QueryIndex.from_store(pll_store(name))
    D = dist_matrix(name)
    rng = np.random.default_rng(5)
    for _ in range(300):
        u, v = rng.integers(0, g.n, 2)
        assert idx.query(int(u), int(v)) == D[u][v]


@pytest.mark.parametrize("name", ["CAL", "SKIT"])
def test_minimality(name):
    """CHL is minimal: removing any (non-self) label breaks the cover
    property for the (v, hub) pair itself (Lemma 1 contrapositive)."""
    store = chl(name)
    D = dist_matrix(name)
    rank = rank_of(name)
    rng = np.random.default_rng(3)
    trip = [t for t in store.triplets() if t[0] != t[1]]
    for v, h, d in [trip[i] for i in rng.choice(len(trip), 40, replace=False)]:
        # h is the argmax-rank vertex on SP(v,h): no other common hub can
        # witness distance d(v,h), so the label is not redundant.
        pruned = LabelMinusOne(store, v, h)
        assert pruned.query(v, h) > D[v][h]


class LabelMinusOne:
    """Query view of a store with one label removed."""

    def __init__(self, store, v, h):
        self.maps = {}
        self.store = store
        self.v, self.h = v, h

    def query(self, u, w):
        a = {hh: dd for hh, dd in self.store.labels_of(u) if not (u == self.v and hh == self.h)}
        b = {hh: dd for hh, dd in self.store.labels_of(w) if not (w == self.v and hh == self.h)}
        best = INF
        for hh, dd in a.items():
            if hh in b:
                best = min(best, dd + b[hh])
        return best


@pytest.mark.parametrize("seed", range(8))
def test_seqpll_random_graphs_random_ranks(seed):
    g = random_connected_graph(40, 40, 7, seed=seed)
    rank = random_rank(40, seed + 100)
    store, stats = seq_pll(g, rank)
    assert store.canonical_set() == brute_chl(g, rank).canonical_set()
    assert stats["trees"] == g.n and not stats["timed_out"]


def test_deadline_timeout():
    g = graph("POK")
    store, stats = seq_pll(g, rank_of("POK"), deadline_s=0.0)
    assert stats["timed_out"] and stats["trees"] < g.n


@pytest.mark.parametrize("name", ["CAL", "SKIT", "POK", "ACT", "EAS"])
def test_als_matches_brute(name):
    assert pll_store(name).als() == pytest.approx(chl(name).als())


def test_self_labels_present():
    store = pll_store("CAL")
    for v in range(store.n):
        assert dict(store.labels_of(v)).get(v) == 0
