"""Micro-benchmarks of the learner's inner loops: similarity scoring,
bottom-clause construction, θ-subsumption, ARMG."""
import pytest

from repro.baselines.castor import SystemConfig, build_learner
from repro.core.clause import head_connected, remove_redundant_literals
from repro.core.generalize import armg
from repro.core.subsumption import reduce_clause, subsumes
from repro.simjoin.similarity import combined_similarity


def test_bench_similarity(benchmark):
    a, b = "Amber River Tiger (1984)", "amber river tigre"
    benchmark(combined_similarity, a, b)


@pytest.fixture(scope="module")
def learner_and_store(spark, bench_movies):
    ds, sim = bench_movies
    learner = build_learner(
        spark, ds, SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3), sim_tables=sim
    )
    store = learner.ground_store(ds.pos + ds.neg)
    return ds, learner, store


def test_bench_ground_bottom_clause(benchmark, learner_and_store):
    ds, learner, _ = learner_and_store
    def run():
        learner._ground_cache = {}
        return learner.ground_store([ds.pos[0]])
    benchmark(run)


def test_bench_subsumption(benchmark, learner_and_store):
    ds, learner, store = learner_and_store
    from repro.core.bottom_clause import build_bottom_clause
    cb = build_bottom_clause(
        learner.db, learner.target, ds.pos[0], mds=learner.mds,
        sim_tables=learner.sim_tables, cfds=[], cfg=learner.cfg.bc,
    )
    cur = reduce_clause(remove_redundant_literals(head_connected(cb)))
    ge = store.examples[ds.pos[0]].ge
    benchmark(subsumes, cur, ge)


def test_bench_armg(benchmark, learner_and_store):
    ds, learner, store = learner_and_store
    from repro.core.bottom_clause import build_bottom_clause
    cb = build_bottom_clause(
        learner.db, learner.target, ds.pos[0], mds=learner.mds,
        sim_tables=learner.sim_tables, cfds=[], cfg=learner.cfg.bc,
    )
    cur = reduce_clause(remove_redundant_literals(head_connected(cb)))
    g = store.examples[ds.pos[1]].ge
    benchmark(armg, cur, g)
