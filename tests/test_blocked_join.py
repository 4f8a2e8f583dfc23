"""Blocked top-k similarity join tests (Spark pipeline, paper §5)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.simjoin.blocked_join import candidate_pairs, topk_similar
from repro.simjoin.similarity import combined_similarity

LEFT = [
    "Amber River Tiger (1984)",
    "Golden Letter Harbor (1999)",
    "Silent Canyon (2001)",
]
RIGHT = [
    "Amber River Tiger",
    "amber river tiger (1984)",
    "Golden Let. Harbor",
    "Silent Canyon (2001)",
    "Unrelated Zebra Quux",
]


@pytest.fixture()
def frames(spark):
    l = spark.createDataFrame(pd.DataFrame({"title": LEFT}))
    r = spark.createDataFrame(pd.DataFrame({"title": RIGHT}))
    return l, r


class TestCandidatePairs:
    def test_shares_word_blocking(self, frames):
        l, r = frames
        pairs = {
            (p.left_value, p.right_value)
            for p in candidate_pairs(l, r, left_col="title", right_col="title").collect()
        }
        assert ("Amber River Tiger (1984)", "Amber River Tiger") in pairs
        assert all(rv != "Unrelated Zebra Quux" for _, rv in pairs)

    def test_case_insensitive_blocking(self, frames):
        l, r = frames
        pairs = {
            (p.left_value, p.right_value)
            for p in candidate_pairs(l, r, left_col="title", right_col="title").collect()
        }
        assert ("Amber River Tiger (1984)", "amber river tiger (1984)") in pairs


class TestTopkSimilar:
    def test_scores_match_scalar_function(self, frames):
        l, r = frames
        rows = topk_similar(
            l, r, left_col="title", right_col="title", k=5, threshold=0.0
        ).collect()
        for row in rows:
            assert row.sim == pytest.approx(
                combined_similarity(row.left_value, row.right_value)
            )

    def test_k_limits_matches(self, frames):
        l, r = frames
        out = topk_similar(l, r, left_col="title", right_col="title", k=1, threshold=0.0)
        counts = out.groupBy("left_value").count().collect()
        assert all(c["count"] <= 1 for c in counts)

    def test_threshold_prunes(self, frames):
        l, r = frames
        out = topk_similar(l, r, left_col="title", right_col="title", k=5, threshold=0.9)
        assert all(row.sim >= 0.9 for row in out.collect())

    def test_true_match_ranks_first(self, frames):
        l, r = frames
        out = topk_similar(l, r, left_col="title", right_col="title", k=1, threshold=0.3)
        best = {row.left_value: row.right_value for row in out.collect()}
        assert best["Silent Canyon (2001)"] == "Silent Canyon (2001)"
        assert best["Amber River Tiger (1984)"] == "amber river tiger (1984)"

    def test_topk_window_oracle(self, frames, spark):
        """The window-based top-k step agrees with a DuckDB window query
        over the same scored candidates."""
        l, r = frames
        scored = topk_similar(
            l, r, left_col="title", right_col="title", k=999, threshold=0.0
        )
        got = (
            scored.withColumn(
                "rk",
                F.row_number().over(
                    __import__("pyspark.sql.window", fromlist=["Window"]).Window
                    .partitionBy("left_value")
                    .orderBy(F.desc("sim"), F.asc("right_value"))
                ),
            )
            .where(F.col("rk") <= 2)
            .select("left_value", "right_value")
        )
        assert_equivalent(
            got,
            """
            SELECT left_value, right_value FROM (
              SELECT left_value, right_value,
                     ROW_NUMBER() OVER (
                       PARTITION BY left_value
                       ORDER BY sim DESC, right_value ASC) AS rk
              FROM scored)
            WHERE rk <= 2
            """,
            scored=scored,
        )

    def test_exact_value_scores_one(self, spark):
        l = spark.createDataFrame(pd.DataFrame({"v": ["same title"]}))
        r = spark.createDataFrame(pd.DataFrame({"v": ["same title", "other"]}))
        rows = topk_similar(l, r, left_col="v", right_col="v", k=1, threshold=0.5).collect()
        assert rows[0].right_value == "same title"
        assert rows[0].sim == pytest.approx(1.0)
