"""Supplementary: Fig. 8 strong scaling + Fig. 9 ALS-vs-q, backing the
abstract's headline claims (42× on 64 nodes; DparaPLL label explosion).

For q in Q_SWEEP, runs DparaPLL, DGLL, PLaNT and Hybrid on a dataset
subset, recording wall time, per-node compute makespan (the honest
scaling metric on a single shared machine), metered communication bytes,
and ALS. DparaPLL runs under a per-node memory budget and reports OOM
exactly like the paper's missing curves.
"""
from __future__ import annotations

import sys
import time
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from common import dump_results, make_spark, print_table

from repro.dist.dgll import dgll
from repro.dist.engine import OOMError
from repro.dist.hybrid import hybrid
from repro.dist.parapll_dist import dpara_pll
from repro.dist.plant_dist import plant_dist
from repro.graphs.generators import DATASETS, build_dataset, is_road
from repro.graphs.ranking import rank_for

Q_SWEEP = (1, 4, 16)
NAMES = ("CAL", "SKIT", "ACT", "POK")
DEADLINE_S = 240.0
#: Scaled 64 GB node for DparaPLL's full-replica storage. Looser than the
#: Table-4 budget so small datasets survive long enough to exhibit the
#: Fig.-9 ALS explosion before the dense ones OOM (the paper's pattern).
NODE_BUDGET_BYTES = 4_000_000


def _attempt(fn):
    t0 = time.perf_counter()
    try:
        r = fn()
        if r.stats.get("timed_out"):
            return {"time_s": "inf", "als": "-", "comm_MB": "-", "makespan_s": "-"}
        return {
            "time_s": round(r.stats["time_s"], 2),
            "als": round(r.stats["als"], 1),
            "comm_MB": round(r.stats["comm"]["total_bytes"] / 1e6, 3),
            "makespan_s": round(r.stats["work_makespan_s"], 2),
        }
    except OOMError:
        return {"time_s": "OOM", "als": "-", "comm_MB": "-", "makespan_s": "-"}


def run(spark, names=NAMES, q_sweep=Q_SWEEP, scale: float = 1.0):
    """Returns the scaling DataFrame (one row per dataset × q × algorithm)."""
    rows = []
    for name in names:
        g = build_dataset(name, scale)
        rank = rank_for(g, DATASETS[name].kind)
        psi = 500.0 if is_road(name) else 100.0
        for q in q_sweep:
            algos = {
                "DparaPLL": lambda: dpara_pll(
                    spark, g, rank, q, budget_bytes=NODE_BUDGET_BYTES,
                    deadline_s=DEADLINE_S, collect=False,
                ),
                "DGLL": lambda: dgll(
                    spark, g, rank, q, deadline_s=DEADLINE_S, collect=False
                ),
                "PLaNT": lambda: plant_dist(
                    spark, g, rank, q, deadline_s=DEADLINE_S, collect=False
                ),
                "Hybrid": lambda: hybrid(
                    spark, g, rank, q, psi_th=psi, deadline_s=DEADLINE_S,
                    collect=False,
                ),
            }
            for algo, fn in algos.items():
                res = _attempt(fn)
                rows.append({"dataset": name, "q": q, "algo": algo, **res})
                print(f"[fig8] {name} q={q} {algo}: {res}", file=sys.stderr, flush=True)
    print_table(
        "Fig. 8/9 (supplementary): strong scaling and ALS vs q",
        rows,
        ["dataset", "q", "algo", "time_s", "makespan_s", "comm_MB", "als"],
    )
    dump_results("fig8_scaling", rows)
    return spark.createDataFrame([{k: str(v) for k, v in r.items()} for r in rows])


if __name__ == "__main__":
    spark = make_spark("fig8")
    args = sys.argv[1:]
    run(spark, names=tuple(args) if args else NAMES)
    spark.stop()
