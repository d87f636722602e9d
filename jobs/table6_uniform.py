"""Reproduce paper Table 6: the Table 4 comparison under the Uniform
edge-probability assignment (Appendix A).

Usage: python jobs/table6_uniform.py [--quick]
"""
import sys

sys.path.insert(0, "jobs")
from _common import get_spark  # noqa: E402
from table4_main import print_table4  # noqa: E402

from repro.eval.tables import table6_rows  # noqa: E402


def main(quick: bool = False) -> None:
    spark = get_spark()
    kw = (
        dict(R=16, k=5, names=["SF-A'"], n_sims=100, infusermg_budget=1200)
        if quick
        else dict(R=64, k=25)
    )
    rows = table6_rows(spark, **kw)
    print_table4(rows, "Table 6 — time / memory / influence (Uniform)")
    spark.stop()


if __name__ == "__main__":
    main(quick="--quick" in sys.argv)
