"""Benchmark of the blocked top-k similarity join (Spark pipeline)."""
from repro.simjoin.blocked_join import topk_similar


def test_bench_topk_similar(benchmark, spark, bench_movies):
    ds, _ = bench_movies

    def run():
        return topk_similar(
            ds.frames["imdb_movies"],
            ds.frames["omdb_movies"],
            left_col="title",
            right_col="title",
            k=10,
            threshold=0.55,
        ).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1)
    assert n > 0
