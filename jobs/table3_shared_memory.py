"""Reproduce paper Table 3: shared-memory algorithms on all 12 datasets.

Per dataset: SparaPLL (ALS + time), CHL ALS, seqPLL time, LCC time, GLL
time. The paper's 2-hour wall clock is scaled to DEADLINE_S at our
~1/1000 data scale; runs past it report ∞, exactly like the paper's
seqPLL rows for USA/ACT/POK/LIJ.
"""
from __future__ import annotations

import sys
import time
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from common import dump_results, fmt, make_spark, print_table

from repro.core.gll import gll
from repro.core.lcc import lcc
from repro.core.parapll import spara_pll
from repro.core.pll import seq_pll
from repro.graphs.generators import DATASETS, build_dataset
from repro.graphs.ranking import rank_for

#: Scaled stand-in for the paper's 2 h budget (data is ~1000× smaller).
DEADLINE_S = 120.0
P_THREADS = 16  # paper: 36 cores / 72 threads; we have 16 cores


def _warmup(spark):
    """Spin up executors/python workers so the first algorithm measured
    doesn't absorb the one-time Spark start-up cost."""
    from repro.core.labels import LabelStore
    from repro.core.parallel import build_trees

    g = build_dataset("SKIT", 0.2)
    r = rank_for(g, "scalefree")
    build_trees(spark, g, r, list(range(32)), LabelStore(g.n))


def run(spark, scale: float = 1.0, deadline_s: float = DEADLINE_S, names=None):
    """Returns the Table-3 DataFrame (one row per dataset)."""
    _warmup(spark)
    rows = []
    for name in names or DATASETS:
        g = build_dataset(name, scale)
        rank = rank_for(g, DATASETS[name].kind)
        row = {"dataset": name, "n": g.n, "m": g.m}

        s, st = spara_pll(spark, g, rank, p=P_THREADS, deadline_s=deadline_s)
        row["spara_als"] = "-" if st["timed_out"] else round(s.als(), 1)
        row["spara_time_s"] = "inf" if st["timed_out"] else round(st["time_s"], 2)

        s, st = seq_pll(g, rank, deadline_s=deadline_s)
        row["chl_als"] = round(s.als(), 1) if not st["timed_out"] else None
        row["seqpll_time_s"] = "inf" if st["timed_out"] else round(st["time_s"], 2)

        s, st = lcc(spark, g, rank, p=P_THREADS, deadline_s=deadline_s)
        row["lcc_time_s"] = "inf" if st["timed_out"] else round(st["time_s"], 2)
        if row["chl_als"] is None and not st["timed_out"]:
            row["chl_als"] = round(s.als(), 1)

        s, st = gll(spark, g, rank, p=P_THREADS, deadline_s=deadline_s)
        row["gll_time_s"] = "inf" if st["timed_out"] else round(st["time_s"], 2)
        row["gll_construct_s"] = round(st["time_construct"], 2)
        row["gll_clean_s"] = round(st["time_clean"], 2)
        if row["chl_als"] is None and not st["timed_out"]:
            row["chl_als"] = round(s.als(), 1)

        rows.append(row)
        print(f"[table3] {name} done", file=sys.stderr, flush=True)
    print_table(
        "Table 3: ALS + labeling time (SparaPLL / seqPLL / LCC / GLL)",
        rows,
        [
            "dataset", "n", "m", "spara_als", "spara_time_s", "chl_als",
            "seqpll_time_s", "lcc_time_s", "gll_time_s",
            "gll_construct_s", "gll_clean_s",
        ],
    )
    dump_results("table3", rows)
    return spark.createDataFrame([{k: str(v) for k, v in r.items()} for r in rows])


if __name__ == "__main__":
    spark = make_spark("table3")
    run(spark)
    spark.stop()
