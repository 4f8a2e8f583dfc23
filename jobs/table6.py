"""Reproduce paper Table 6: scaling the number of training examples on
IMDB+OMDB (three MDs) with CFD violations, k_m ∈ {5, 2}.

Usage: ``python jobs/table6.py [--smoke]``
"""
import sys

from _session import emit, get_spark


def main() -> None:
    from repro.eval.tables import SMOKE, table6

    spark = get_spark("repro-table6")
    smoke = "--smoke" in sys.argv
    rows = table6(
        spark,
        scale=SMOKE if smoke else None,
        sizes=(24, 48) if smoke else (50, 100, 200, 400),
    )
    emit("table6", rows, ["k_m", "n_pos", "n_neg", "f1", "time_min"])
    spark.stop()


if __name__ == "__main__":
    main()
