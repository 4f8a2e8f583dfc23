"""Reproduce paper Table 4: learning over all datasets with MDs.

Usage: ``python jobs/table4.py [--smoke]``
"""
import sys

from _session import emit, get_spark


def main() -> None:
    from repro.eval.tables import SMOKE, table4

    spark = get_spark("repro-table4")
    scale = SMOKE if "--smoke" in sys.argv else None
    rows = table4(spark, scale=scale)
    emit("table4", rows, ["dataset", "system", "f1", "time_min"])
    spark.stop()


if __name__ == "__main__":
    main()
