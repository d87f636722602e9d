"""Reproduce paper Table 5: re-evaluation counts of CELF vs P-tree vs
Win-Tree on every suite graph (k = 100 seeds, R = 64 sketches).

Usage: python jobs/table5_evals.py [--quick]
"""
import sys

sys.path.insert(0, "jobs")
from _common import fmt, print_markdown  # noqa: E402

from repro.eval.tables import table5_rows  # noqa: E402


def main(quick: bool = False) -> None:
    kw = dict(R=16, k=20, names=["SF-A", "ROAD-A"]) if quick else dict(R=64, k=100)
    rows = table5_rows(**kw)
    print("\n## Table 5 — number of re-evaluations per selector\n")
    print_markdown(
        ["graph", "class", "n", "CELF", "P-tree", "Win-Tree",
         "PT/CELF", "WT/CELF", "PT jobs", "WT jobs"],
        [
            [
                r["graph"], r["class"], str(r["n"]),
                str(r["evals"]["celf"]), str(r["evals"]["ptree"]),
                str(r["evals"]["wintree"]),
                fmt(r["ptree_ratio"], 3), fmt(r["wintree_ratio"], 3),
                str(r["jobs"]["ptree"]), str(r["jobs"]["wintree"]),
            ]
            for r in rows
        ],
    )


if __name__ == "__main__":
    main(quick="--quick" in sys.argv)
