"""Classification metrics and cross-validation splits (paper §6.1.3:
5-fold cross validation, average F1-score and time)."""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class Scores:
    tp: int
    fp: int
    fn: int
    tn: int

    @property
    def precision(self) -> float:
        return self.tp / (self.tp + self.fp) if (self.tp + self.fp) else 0.0

    @property
    def recall(self) -> float:
        return self.tp / (self.tp + self.fn) if (self.tp + self.fn) else 0.0

    @property
    def f1(self) -> float:
        p, r = self.precision, self.recall
        return 2 * p * r / (p + r) if (p + r) else 0.0


def score_predictions(
    pos_pred: list[bool], neg_pred: list[bool]
) -> Scores:
    """Predictions over held-out positives and negatives → confusion."""
    tp = sum(pos_pred)
    fn = len(pos_pred) - tp
    fp = sum(neg_pred)
    tn = len(neg_pred) - fp
    return Scores(tp=tp, fp=fp, fn=fn, tn=tn)


def kfold_indices(n: int, k: int, *, seed: int = 0) -> list[np.ndarray]:
    """Deterministic shuffled k-fold index partition of ``range(n)``."""
    rng = np.random.default_rng(seed)
    idx = rng.permutation(n)
    return [idx[f::k] for f in range(k)]


def kfold_splits(
    pos: list, neg: list, k: int, *, seed: int = 0
) -> list[tuple[list, list, list, list]]:
    """Stratified folds: (train_pos, train_neg, test_pos, test_neg) per fold."""
    pf = kfold_indices(len(pos), k, seed=seed)
    nf = kfold_indices(len(neg), k, seed=seed + 1)
    out = []
    for f in range(k):
        test_p = {int(i) for i in pf[f]}
        test_n = {int(i) for i in nf[f]}
        out.append(
            (
                [e for i, e in enumerate(pos) if i not in test_p],
                [e for i, e in enumerate(neg) if i not in test_n],
                [e for i, e in enumerate(pos) if i in test_p],
                [e for i, e in enumerate(neg) if i in test_n],
            )
        )
    return out
