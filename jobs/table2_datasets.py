"""Reproduce paper Table 2: the evaluation dataset suite.

Prints, per dataset, the paper's real graph size next to the synthetic
analogue actually generated at benchmark scale, plus topology type and
the ranking scheme used (betweenness for roads, degree otherwise).
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from common import dump_results, make_spark, print_table

from repro.graphs.generators import DATASETS, build_dataset, is_road


def run(spark, scale: float = 1.0):
    """Returns the Table-2 DataFrame (one row per dataset)."""
    rows = []
    for name, spec in DATASETS.items():
        g = build_dataset(name, scale)
        rows.append(
            {
                "dataset": name,
                "kind": spec.kind,
                "type": "Directed(src)" if spec.directed_src else "Undirected",
                "paper_n": spec.paper_n,
                "paper_m": spec.paper_m,
                "ours_n": g.n,
                "ours_m": g.m,
                "avg_deg": round(2 * g.m / g.n, 2),
                "ranking": "betweenness" if is_road(name) else "degree",
            }
        )
    print_table(
        "Table 2: datasets (paper sizes vs synthetic analogues)",
        rows,
        ["dataset", "kind", "type", "paper_n", "paper_m", "ours_n", "ours_m", "avg_deg", "ranking"],
    )
    dump_results("table2", rows)
    return spark.createDataFrame(rows)


if __name__ == "__main__":
    spark = make_spark("table2")
    run(spark).show(truncate=False)
    spark.stop()
