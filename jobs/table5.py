"""Reproduce paper Table 5: DLearn-CFD vs DLearn-Repaired under
injected CFD violations (p ∈ {5, 10, 20}%).

Usage: ``python jobs/table5.py [--smoke]``
"""
import sys

from _session import emit, get_spark


def main() -> None:
    from repro.eval.tables import SMOKE, table5

    spark = get_spark("repro-table5")
    scale = SMOKE if "--smoke" in sys.argv else None
    rows = table5(spark, scale=scale)
    emit("table5", rows, ["dataset", "system", "p", "f1", "time_min"])
    spark.stop()


if __name__ == "__main__":
    main()
