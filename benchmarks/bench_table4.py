"""Table 4 benchmark: one fold of each system over the small movies
corpus (full-scale numbers come from ``jobs/table4.py``)."""
import pytest

from repro.baselines.castor import SystemConfig
from repro.eval.harness import evaluate_system

SYSTEMS = [
    ("nomd", SystemConfig(mode="nomd", d=4, min_pos=3)),
    ("exact", SystemConfig(mode="exact", d=4, min_pos=3)),
    ("clean", SystemConfig(mode="clean", k_m=10, d=4, min_pos=3)),
    ("dlearn_k2", SystemConfig(mode="dlearn", k_m=2, d=4, min_pos=3)),
    ("dlearn_k5", SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3)),
]


@pytest.mark.parametrize("name,cfg", SYSTEMS, ids=[s[0] for s in SYSTEMS])
def test_bench_table4_system(benchmark, spark, bench_movies, name, cfg):
    ds, sim = bench_movies

    def run():
        return evaluate_system(
            spark, ds, cfg, system_name=name, n_folds=3, max_folds=1,
            sim_tables=sim,
        )

    r = benchmark.pedantic(run, rounds=1, iterations=1)
    assert 0.0 <= r.f1 <= 1.0
