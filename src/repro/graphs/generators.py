"""Seeded synthetic analogues of the paper's 12 evaluation graphs (Table 2).

The paper evaluates on DIMACS road networks (CAL/EAS/CTR/USA) and
KONECT/SNAP scale-free graphs (SKIT/WND/AUT/YTB/ACT/BDU/POK/LIJ). Those
inputs are 10^6..10^8 edges and not available offline, so we generate
topological stand-ins at ~1/1000 scale (DESIGN.md §2):

* road networks  -> 2D grid + random diagonal shortcuts: high diameter,
  low tree-width, small integer weights. Ranked by sampled betweenness.
* scale-free     -> Barabasi-Albert preferential attachment: core-fringe
  structure, degree ranking, weights uniform in [1, sqrt(n)) exactly as
  the paper assigns to its unweighted sources.
* POK / LIJ      -> random (cycle + uniform edges) graphs whose *weak*
  hierarchy reproduces the paper's "huge ALS" outliers.

Everything is deterministic in (name, scale, seed).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSRGraph, from_edges


@dataclass(frozen=True)
class GraphSpec:
    """Recipe for one synthetic dataset.

    Attributes:
        name: dataset tag used throughout tests/benches (paper's name + "-lite").
        kind: "road" | "scalefree" | "random" — selects generator and ranking.
        n: vertex count at scale=1.0 (the benchmark scale).
        deg: target average degree (edges factor).
        seed: RNG seed.
        paper_n / paper_m: the real dataset's size, recorded for Table 2.
        directed_src: whether the paper's source graph was directed
            (we symmetrise; recorded for the Table 2 "Type" column).
    """

    name: str
    kind: str
    n: int
    deg: float
    seed: int
    paper_n: int
    paper_m: int
    directed_src: bool = False


#: The 12 analogues, keyed by paper dataset tag. `n` values are chosen so the
#: full Table-3 sweep finishes in minutes in pure Python while preserving the
#: road-vs-scale-free contrast and POK/LIJ's weak-hierarchy ALS blow-up.
DATASETS: dict[str, GraphSpec] = {
    "CAL": GraphSpec("CAL", "road", 1892, 2.46, 101, 1_890_815, 4_657_742),
    "EAS": GraphSpec("EAS", "road", 3600, 2.44, 102, 3_598_623, 8_778_114),
    "CTR": GraphSpec("CTR", "road", 5184, 2.44, 103, 14_081_816, 34_292_496),
    "USA": GraphSpec("USA", "road", 6400, 2.44, 104, 23_947_347, 58_333_344),
    "SKIT": GraphSpec("SKIT", "scalefree", 1200, 3.3, 105, 192_244, 636_643),
    "WND": GraphSpec("WND", "scalefree", 1500, 4.6, 106, 325_729, 1_497_134, True),
    "AUT": GraphSpec("AUT", "scalefree", 1100, 3.6, 107, 227_320, 814_134),
    "YTB": GraphSpec("YTB", "scalefree", 2000, 2.6, 108, 1_134_890, 2_987_624),
    "ACT": GraphSpec("ACT", "scalefree", 1200, 12.0, 109, 382_219, 33_115_812),
    "BDU": GraphSpec("BDU", "scalefree", 2100, 8.3, 110, 2_141_300, 17_794_839, True),
    "POK": GraphSpec("POK", "random", 1600, 12.0, 111, 1_632_803, 30_622_564, True),
    "LIJ": GraphSpec("LIJ", "random", 2400, 10.0, 112, 4_847_571, 68_993_773, True),
}

#: Datasets the paper groups as road networks (betweenness ranking, Ψ_th=500).
ROAD = ("CAL", "EAS", "CTR", "USA")


def grid_road(n: int, deg: float, seed: int) -> CSRGraph:
    """High-diameter road-network stand-in: 2D grid + diagonal shortcuts.

    Weights are uniform ints in [1, 10] (road-segment lengths). The extra
    diagonals lift the average degree from the grid's ~2 toward ``deg``.
    """
    g = np.random.default_rng(seed)
    side = int(np.ceil(np.sqrt(n)))
    ids = np.arange(side * side).reshape(side, side)
    # Grid edges.
    right = np.stack([ids[:, :-1].ravel(), ids[:, 1:].ravel()], axis=1)
    down = np.stack([ids[:-1, :].ravel(), ids[1:, :].ravel()], axis=1)
    edges = [right, down]
    # Diagonal shortcuts until target degree.
    n_extra = max(0, int(deg * side * side) - len(right) - len(down))
    if n_extra:
        diag = np.stack([ids[:-1, :-1].ravel(), ids[1:, 1:].ravel()], axis=1)
        pick = g.choice(len(diag), size=min(n_extra, len(diag)), replace=False)
        edges.append(diag[pick])
    e = np.concatenate(edges)
    w = g.integers(1, 11, size=len(e))
    return from_edges(side * side, e[:, 0], e[:, 1], w)


def scale_free(n: int, deg: float, seed: int) -> CSRGraph:
    """Barabasi-Albert preferential attachment; weights uniform in [1, sqrt(n)).

    Each arriving vertex attaches ``k = max(1, round(deg/2))`` edges to
    endpoints sampled from the repeated-endpoints pool (classic linear
    preferential attachment), which yields the dense-core / sparse-fringe
    structure the Hybrid algorithm exploits (paper §5.2.1).
    """
    g = np.random.default_rng(seed)
    k = max(1, int(round(deg / 2)))
    src, dst = [], []
    pool = list(range(k + 1))  # seed clique endpoints
    for u in range(k + 1):
        for v in range(u + 1, k + 1):
            src.append(u)
            dst.append(v)
    for v in range(k + 1, n):
        targets = set()
        while len(targets) < k:
            targets.add(pool[g.integers(0, len(pool))])
        for t in targets:
            src.append(v)
            dst.append(t)
            pool.append(t)
        pool.extend([v] * k)
    # Fractional degree remainder: extra uniform→preferential edges, so a
    # deg=2.6 spec does not degenerate to a tree (k would round to 1).
    n_extra = max(0, int(deg * n / 2) - len(src))
    for _ in range(n_extra):
        u = int(g.integers(0, n))
        t = pool[g.integers(0, len(pool))]
        if u != t:
            src.append(u)
            dst.append(t)
    wmax = max(2, int(np.sqrt(n)))
    w = g.integers(1, wmax, size=len(src))
    return from_edges(n, np.array(src), np.array(dst), w)


def random_graph(n: int, deg: float, seed: int) -> CSRGraph:
    """Connected near-Erdos-Renyi graph: a random cycle + uniform edges.

    No hub structure -> degree ranking prunes poorly -> large ALS, the
    paper's POK/LIJ behaviour. Weights uniform in [1, sqrt(n)).
    """
    g = np.random.default_rng(seed)
    perm = g.permutation(n)
    cyc_src, cyc_dst = perm, np.roll(perm, 1)
    n_extra = max(0, int(deg * n / 2) - n)
    ex_src = g.integers(0, n, size=n_extra)
    ex_dst = g.integers(0, n, size=n_extra)
    src = np.concatenate([cyc_src, ex_src])
    dst = np.concatenate([cyc_dst, ex_dst])
    wmax = max(2, int(np.sqrt(n)))
    w = g.integers(1, wmax, size=len(src))
    return from_edges(n, src, dst, w)


_KIND_FN = {"road": grid_road, "scalefree": scale_free, "random": random_graph}


def build_dataset(name: str, scale: float = 1.0) -> CSRGraph:
    """Materialise dataset ``name`` at ``scale`` (vertex count scales linearly).

    ``scale=1.0`` is benchmark scale (Table 2 "lite" sizes); tests use
    ``scale≈0.05`` for sub-second labeling runs.
    """
    spec = DATASETS[name]
    n = max(16, int(spec.n * scale))
    return _KIND_FN[spec.kind](n, spec.deg, spec.seed)


def is_road(name: str) -> bool:
    """Whether the paper treats this dataset as a road network."""
    return name in ROAD
