"""End-to-end learner tests over the synthetic corpora (small scale).

These exercise the full pipeline: Spark generation → blocked similarity
join → LocalDB collection → bottom clauses → ARMG → coverage → covering
loop → prediction, and assert the paper's qualitative orderings.
"""
import pytest

from repro.baselines.castor import (
    SystemConfig,
    build_learner,
    compute_sim_tables,
    md_domain_map,
)
from repro.core.dlearn import timed_fit
from repro.datasets import movies, papers
from repro.eval.harness import evaluate_system
from repro.eval.metrics import score_predictions


@pytest.fixture(scope="module")
def movie_ds(spark):
    return movies.generate(spark, n_movies=220, n_pos=24, n_neg=48, seed=3)


@pytest.fixture(scope="module")
def movie_sim(movie_ds):
    return compute_sim_tables(movie_ds, k=10)


@pytest.fixture(scope="module")
def paper_ds(spark):
    return papers.generate(spark, n_papers=200, n_pos=30, n_neg=60, seed=3)


def _f1(spark, ds, cfg, sim):
    learner = build_learner(spark, ds, cfg, sim_tables=sim)
    n_tr_p, n_tr_n = int(len(ds.pos) * 0.7), int(len(ds.neg) * 0.7)
    definition, secs = timed_fit(learner, ds.pos[:n_tr_p], ds.neg[:n_tr_n])
    s = score_predictions(
        learner.predict(definition, ds.pos[n_tr_p:]),
        learner.predict(definition, ds.neg[n_tr_n:]),
    )
    return s, definition, secs


class TestMoviesOrdering:
    def test_dlearn_beats_nomd(self, spark, movie_ds, movie_sim):
        s_dl, d_dl, _ = _f1(
            spark, movie_ds, SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3), movie_sim
        )
        s_no, _, _ = _f1(
            spark, movie_ds, SystemConfig(mode="nomd", d=4, min_pos=3), movie_sim
        )
        assert s_dl.f1 > s_no.f1
        assert s_dl.f1 > 0.45  # tiny-scale fixture; full scale in jobs/

    def test_learned_clause_uses_similarity_join(self, spark, movie_ds, movie_sim):
        _, definition, _ = _f1(
            spark, movie_ds, SystemConfig(mode="dlearn", k_m=5, d=4, min_pos=3), movie_sim
        )
        assert definition.clauses
        best = definition.clauses[0]
        preds = {l.pred for l in best.body}
        assert "__sim__" in preds
        assert any(p.startswith("omdb") for p in preds)

    def test_timed_fit_returns_positive_time(self, spark, movie_ds, movie_sim):
        _, _, secs = _f1(
            spark, movie_ds, SystemConfig(mode="nomd", d=2, min_pos=3), movie_sim
        )
        assert secs > 0


class TestPapersNoMDZero:
    def test_nomd_learns_nothing(self, spark, paper_ds):
        """Paper Table 4: Castor-NoMD F1 = 0 on DBLP+Scholar — the year
        is only connected through the similarity join."""
        s, definition, _ = _f1(
            spark, paper_ds, SystemConfig(mode="nomd", d=3, min_pos=3), {}
        )
        assert s.f1 == 0.0

    def test_dlearn_learns_year_join(self, spark, paper_ds):
        sim = compute_sim_tables(paper_ds, k=10)
        s, definition, _ = _f1(
            spark, paper_ds, SystemConfig(mode="dlearn", k_m=10, d=3, min_pos=3), sim
        )
        assert s.f1 > 0.4
        preds = {l.pred for c in definition.clauses for l in c.body}
        assert "dblp_papers" in preds and "scholar_papers" in preds


class TestDomainMap:
    def test_one_md_merges_only_titles(self, movie_ds):
        m = md_domain_map(movie_ds)
        assert m == {"omdb_title": "imdb_title"}

    def test_three_mds_merge_names(self, movie_ds):
        m = md_domain_map(movies.with_three_mds(movie_ds))
        assert set(m) == {"omdb_title", "omdb_actor", "omdb_writer"}


class TestHarness:
    def test_evaluate_system_runs(self, spark, movie_ds, movie_sim):
        r = evaluate_system(
            spark,
            movie_ds,
            SystemConfig(mode="dlearn", k_m=2, d=4, min_pos=3),
            system_name="DLearn",
            n_folds=3,
            max_folds=1,
            sim_tables=movie_sim,
        )
        assert len(r.folds) == 1
        assert 0.0 <= r.f1 <= 1.0
        assert r.time_minutes > 0
        row = r.row()
        assert set(row) == {"dataset", "system", "f1", "time_min"}
