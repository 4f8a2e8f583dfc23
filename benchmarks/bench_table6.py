"""Table 6 benchmark: learning-time growth with the number of training
examples (full sweep in ``jobs/table6.py``)."""
import pytest

from repro.baselines.castor import SystemConfig, compute_sim_tables
from repro.datasets import movies
from repro.eval.harness import evaluate_system


@pytest.mark.parametrize("n_pos", [24, 48], ids=["P24", "P48"])
def test_bench_table6_examples(benchmark, spark, n_pos):
    ds = movies.generate(
        spark, n_movies=max(300, n_pos * 5), n_pos=n_pos, n_neg=2 * n_pos, seed=0
    )
    sim = compute_sim_tables(ds, k=2)
    cfg = SystemConfig(mode="dlearn", k_m=2, d=4, min_pos=3)

    def run():
        return evaluate_system(
            spark, ds, cfg, system_name=f"P{n_pos}", n_folds=3, max_folds=1,
            sim_tables=sim,
        )

    r = benchmark.pedantic(run, rounds=1, iterations=1)
    assert 0.0 <= r.f1 <= 1.0
