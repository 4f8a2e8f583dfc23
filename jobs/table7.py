"""Reproduce paper Table 7: effect of the number of bottom-clause
iterations d on IMDB+OMDB (3 MDs + CFDs), k_m = 5.

Usage: ``python jobs/table7.py [--smoke]``
"""
import sys

from _session import emit, get_spark


def main() -> None:
    from repro.eval.tables import SMOKE, table7

    spark = get_spark("repro-table7")
    scale = SMOKE if "--smoke" in sys.argv else None
    rows = table7(spark, scale=scale)
    emit("table7", rows, ["d", "f1", "time_min"])
    spark.stop()


if __name__ == "__main__":
    main()
