"""Metrics and cross-validation split tests (paper §6.1.3)."""
import pytest

from repro.eval.metrics import Scores, kfold_splits, score_predictions


class TestScores:
    def test_perfect(self):
        s = score_predictions([True] * 5, [False] * 10)
        assert s.f1 == 1.0 and s.precision == 1.0 and s.recall == 1.0

    def test_empty_definition(self):
        s = score_predictions([False] * 5, [False] * 10)
        assert s.f1 == 0.0

    def test_known_values(self):
        s = score_predictions([True, True, False, False], [True, False])
        assert s.tp == 2 and s.fn == 2 and s.fp == 1 and s.tn == 1
        assert s.precision == pytest.approx(2 / 3)
        assert s.recall == pytest.approx(0.5)
        assert s.f1 == pytest.approx(2 * (2 / 3) * 0.5 / ((2 / 3) + 0.5))

    def test_all_positive_predictor(self):
        s = score_predictions([True] * 4, [True] * 8)
        assert s.precision == pytest.approx(1 / 3) and s.recall == 1.0


class TestKFold:
    def test_partition(self):
        pos = list(range(10))
        neg = list(range(100, 120))
        folds = kfold_splits(pos, neg, 5, seed=1)
        assert len(folds) == 5
        all_test_p = [e for _, _, tp, _ in folds for e in tp]
        assert sorted(all_test_p) == pos  # every example tested once

    def test_train_test_disjoint(self):
        folds = kfold_splits(list(range(20)), list(range(40)), 4, seed=2)
        for tr_p, tr_n, te_p, te_n in folds:
            assert not set(tr_p) & set(te_p)
            assert not set(tr_n) & set(te_n)

    def test_deterministic(self):
        a = kfold_splits(list(range(9)), list(range(9)), 3, seed=5)
        b = kfold_splits(list(range(9)), list(range(9)), 3, seed=5)
        assert a == b

    @pytest.mark.parametrize("k", [2, 3, 5])
    def test_fold_sizes_balanced(self, k):
        folds = kfold_splits(list(range(30)), list(range(30)), k, seed=0)
        sizes = [len(tp) for _, _, tp, _ in folds]
        assert max(sizes) - min(sizes) <= 1
