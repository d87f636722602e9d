"""Reproduce paper Table 3: graph information + influence of k seeds.

Usage: python jobs/table3_graphs.py [--quick]
"""
import sys

sys.path.insert(0, "jobs")
from _common import fmt, get_spark, print_markdown  # noqa: E402

from repro.eval.tables import table3_rows  # noqa: E402


def main(quick: bool = False) -> None:
    spark = get_spark()
    kw = dict(R=16, k=20, n_sims=200, names=["SF-A", "ROAD-A"]) if quick else dict(
        R=64, k=100, n_sims=2000
    )
    rows = table3_rows(spark, **kw)
    print("\n## Table 3 — graph information and influence of selected seeds\n")
    print_markdown(
        ["graph", "class", "|V|", "|E|", "p", "influence (MC)", "influence (sketch est.)"],
        [
            [
                r["graph"], r["class"], str(r["n"]), str(r["m"]),
                fmt(r["p"]), fmt(r["influence"], 1), fmt(r["sketch_estimate"], 1),
            ]
            for r in rows
        ],
    )
    spark.stop()


if __name__ == "__main__":
    main(quick="--quick" in sys.argv)
