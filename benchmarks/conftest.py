"""Benchmark fixtures: share the session SparkSession from the root
conftest and pre-built small corpora."""
import pytest

from repro.baselines.castor import compute_sim_tables
from repro.datasets import movies


@pytest.fixture(scope="session")
def bench_movies(spark):
    ds = movies.generate(spark, n_movies=220, n_pos=24, n_neg=48, seed=0)
    sim = compute_sim_tables(ds, k=10)
    return ds, sim
