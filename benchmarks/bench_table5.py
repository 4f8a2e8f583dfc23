"""Table 5 benchmark: DLearn-CFD vs DLearn-Repaired at p = 0.10 on the
small movies corpus (full sweep in ``jobs/table5.py``)."""
import pytest

from repro.baselines.castor import SystemConfig, compute_sim_tables
from repro.cfd.inject import inject_dataset
from repro.eval.harness import evaluate_system

SYSTEMS = [
    ("cfd", SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3, use_cfd_repairs=True)),
    ("repaired", SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3, repair_data=True)),
]


@pytest.fixture(scope="module")
def dirty_movies(spark, bench_movies):
    ds, _ = bench_movies
    dirty = inject_dataset(ds, p=0.10, seed=0)
    sim = compute_sim_tables(dirty, k=10)
    return dirty, sim


@pytest.mark.parametrize("name,cfg", SYSTEMS, ids=[s[0] for s in SYSTEMS])
def test_bench_table5_system(benchmark, spark, dirty_movies, name, cfg):
    ds, sim = dirty_movies

    def run():
        return evaluate_system(
            spark, ds, cfg, system_name=name, n_folds=3, max_folds=1,
            sim_tables=sim,
        )

    r = benchmark.pedantic(run, rounds=1, iterations=1)
    assert 0.0 <= r.f1 <= 1.0
