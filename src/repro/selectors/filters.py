"""Filter selectors: Mutual Information, Chi-square, Gini index.

Each scores every pooled feature against the training labels independently
and keeps the top-n. Chi2 and Gini are defined for classification only
(paper Table III leaves them "-" on the Merchant regression dataset).
"""
from __future__ import annotations

import numpy as np

from repro.core.evaluator import DownstreamEvaluator
from repro.core.executor import FeatureFrame
from repro.core.proxy import _bin_feature, mutual_information


class NotApplicableError(ValueError):
    """Selector undefined for this task (e.g. Chi2 on regression)."""


def _train_xy(pool: list[FeatureFrame], evaluator: DownstreamEvaluator):
    tr = evaluator.splits.train
    X = np.column_stack([evaluator.feature_on(tr, f) for f in pool])
    y = tr[evaluator.splits.label].to_numpy()
    return X, y


def _top(pool: list[FeatureFrame], scores: np.ndarray, n: int) -> list[FeatureFrame]:
    order = np.argsort(-np.nan_to_num(scores, nan=-np.inf), kind="stable")[:n]
    return [pool[i] for i in order]


def mi_select(pool, evaluator, n: int) -> list[FeatureFrame]:
    X, y = _train_xy(pool, evaluator)
    task = evaluator.splits.task
    scores = np.array([mutual_information(X[:, j], y, task=task)
                       for j in range(X.shape[1])])
    return _top(pool, scores, n)


def chi2_statistic(x: np.ndarray, y: np.ndarray, n_bins: int = 8) -> float:
    """Pearson χ² of the (binned feature × class) contingency table."""
    bx = _bin_feature(x, n_bins)
    _, by = np.unique(y, return_inverse=True)
    ux = np.unique(bx)
    k = by.max() + 1
    obs = np.zeros((len(ux), k))
    for i, b in enumerate(ux):
        m = bx == b
        obs[i] = np.bincount(by[m], minlength=k)
    row = obs.sum(axis=1, keepdims=True)
    col = obs.sum(axis=0, keepdims=True)
    exp = row @ col / obs.sum()
    with np.errstate(divide="ignore", invalid="ignore"):
        cells = np.where(exp > 0, (obs - exp) ** 2 / exp, 0.0)
    return float(cells.sum())


def chi2_select(pool, evaluator, n: int) -> list[FeatureFrame]:
    if evaluator.splits.task == "regression":
        raise NotApplicableError("Chi2 selector is classification-only")
    X, y = _train_xy(pool, evaluator)
    scores = np.array([chi2_statistic(X[:, j], y) for j in range(X.shape[1])])
    return _top(pool, scores, n)


def gini_gain(x: np.ndarray, y: np.ndarray, n_thresholds: int = 16) -> float:
    """Best single-split Gini impurity decrease of feature x."""
    x = np.nan_to_num(np.asarray(x, dtype=float), nan=0.0)
    _, yi = np.unique(y, return_inverse=True)
    k = yi.max() + 1
    n = len(yi)

    def gini(counts: np.ndarray) -> float:
        tot = counts.sum()
        if tot == 0:
            return 0.0
        p = counts / tot
        return 1.0 - float((p * p).sum())

    total = np.bincount(yi, minlength=k).astype(float)
    parent = gini(total)
    best = 0.0
    for t in np.unique(np.quantile(x, np.linspace(0, 1, n_thresholds + 1)[1:-1])):
        m = x <= t
        nl = int(m.sum())
        if nl == 0 or nl == n:
            continue
        left = np.bincount(yi[m], minlength=k).astype(float)
        g = parent - (nl / n) * gini(left) - ((n - nl) / n) * gini(total - left)
        best = max(best, float(g))
    return best


def gini_select(pool, evaluator, n: int) -> list[FeatureFrame]:
    if evaluator.splits.task == "regression":
        raise NotApplicableError("Gini selector is classification-only")
    X, y = _train_xy(pool, evaluator)
    scores = np.array([gini_gain(X[:, j], y) for j in range(X.shape[1])])
    return _top(pool, scores, n)
