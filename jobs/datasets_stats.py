"""Table 3 analogue: statistics of the synthetic corpora.

Usage: ``python jobs/datasets_stats.py``
"""
from _session import emit, get_spark


def main() -> None:
    from repro.eval.tables import dataset_stats

    spark = get_spark("repro-stats")
    rows = dataset_stats(spark)
    emit(
        "table3_stats",
        rows,
        ["dataset", "relations", "tuples", "pos", "neg", "mds", "cfds"],
    )
    spark.stop()


if __name__ == "__main__":
    main()
