"""Table 7 benchmark: bottom-clause iteration depth d sweep (full sweep
in ``jobs/table7.py``)."""
import pytest

from repro.baselines.castor import SystemConfig
from repro.eval.harness import evaluate_system


@pytest.mark.parametrize("d", [2, 3, 4], ids=["d2", "d3", "d4"])
def test_bench_table7_depth(benchmark, spark, bench_movies, d):
    ds, sim = bench_movies
    cfg = SystemConfig(mode="dlearn", k_m=5, d=d, min_pos=3)

    def run():
        return evaluate_system(
            spark, ds, cfg, system_name=f"d={d}", n_folds=3, max_folds=1,
            sim_tables=sim,
        )

    r = benchmark.pedantic(run, rounds=1, iterations=1)
    assert 0.0 <= r.f1 <= 1.0
