"""Low-cost proxies for feature quality (§V-C warm-up, §VI-C1, §VII-E2).

Three proxies from the paper's Table VIII, all returning *higher = better*
scores for a single candidate feature column against the labels:

- ``MI``  — binned mutual information (base 2); features are quantile-binned
  (missing values form their own bin), regression labels are quantile-binned
  too;
- ``SC``  — |Spearman rank correlation|;
- ``LR``  — the validation metric of a logistic-regression model trained on
  base features + the candidate (the most expensive proxy).
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _bin_feature(x: np.ndarray, n_bins: int) -> np.ndarray:
    """Quantile-bin a float column; NaNs become their own bin id."""
    x = np.asarray(x, dtype=float)
    out = np.full(x.shape, -1, dtype=int)
    ok = np.isfinite(x)
    if ok.sum() == 0:
        return out
    xs = x[ok]
    edges = np.unique(np.quantile(xs, np.linspace(0, 1, n_bins + 1)[1:-1]))
    out[ok] = np.searchsorted(edges, xs, side="right")
    return out


def mutual_information(x: np.ndarray, y: np.ndarray, *, task: str = "binary",
                       n_bins: int = 8) -> float:
    """I(X;Y) in bits from the joint histogram of binned X and (binned) Y."""
    bx = _bin_feature(x, n_bins)
    if task == "regression":
        by = _bin_feature(np.asarray(y, dtype=float), n_bins)
    else:
        _, by = np.unique(np.asarray(y), return_inverse=True)
    n = bx.size
    if n == 0:
        return 0.0
    joint: dict[tuple[int, int], int] = {}
    for a, b in zip(bx, by):
        joint[(a, b)] = joint.get((a, b), 0) + 1
    px: dict[int, float] = {}
    py: dict[int, float] = {}
    for (a, b), c in joint.items():
        px[a] = px.get(a, 0) + c
        py[b] = py.get(b, 0) + c
    mi = 0.0
    for (a, b), c in joint.items():
        p = c / n
        mi += p * np.log2(p * n * n / (px[a] * py[b]))
    return float(max(mi, 0.0))


def spearman(x: np.ndarray, y: np.ndarray) -> float:
    """|Spearman ρ| — monotonic dependency strength (Table VIII "SC")."""
    x = pd.Series(np.asarray(x, dtype=float)).fillna(0.0)
    y = pd.Series(np.asarray(y, dtype=float))
    rx, ry = x.rank(), y.rank()
    sx, sy = rx.std(), ry.std()
    if sx < 1e-12 or sy < 1e-12:
        return 0.0
    rho = float(np.corrcoef(rx, ry)[0, 1])
    return abs(rho) if np.isfinite(rho) else 0.0


def make_proxy(name: str, *, task: str, base_X: np.ndarray | None = None,
               y_valid: np.ndarray | None = None, X_valid_base: np.ndarray | None = None,
               seed: int = 0):
    """Build ``proxy(x_train, y_train[, x_valid]) -> score`` (higher=better).

    ``MI`` and ``SC`` only use the training rows. ``LR`` trains a logistic /
    ridge model on base features + candidate and scores the validation rows
    (needs the ``base_X``/``X_valid_base``/``y_valid`` context).
    """
    if name == "MI":
        return lambda x, y, xv=None: mutual_information(x, y, task=task)
    if name == "SC":
        return lambda x, y, xv=None: spearman(x, y)
    if name == "LR":
        from repro.models.logistic import LogisticRegression
        from repro.models.metrics import task_loss

        if base_X is None or y_valid is None or X_valid_base is None:
            raise ValueError("LR proxy needs base_X, X_valid_base and y_valid")
        lr_task = "regression" if task == "regression" else task

        def _lr_proxy(x, y, xv):
            X = np.column_stack([base_X, np.nan_to_num(x, nan=0.0)])
            Xv = np.column_stack([X_valid_base, np.nan_to_num(xv, nan=0.0)])
            m = LogisticRegression(task=lr_task, n_iter=80, seed=seed).fit(X, y)
            return -task_loss(task, y_valid, m, Xv)

        return _lr_proxy
    raise ValueError(f"unknown proxy {name!r} (expected MI, SC or LR)")
