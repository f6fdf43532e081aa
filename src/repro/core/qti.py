"""Query Template Identification (§VI): beam search + two optimizations.

The space of WHERE-attribute combinations ``P ⊆ attr`` is a tree whose
layer ℓ holds the size-ℓ combos (Figure 4). Beam search expands only the
top-β nodes per layer. Two optimizations make it practical:

- **O1 — low-cost proxy** (§VI-C1): a node's effectiveness is the best
  *proxy* score (default: MI) found by a short search in its query pool,
  instead of the best real validation loss;
- **O2 — promising-template predictor** (§VI-C2): a ridge regressor over
  one-hot combo encodings, trained layer-by-layer on (encoding, proxy)
  pairs, pre-ranks each layer's children so only the predicted top-β get
  proxy-evaluated.

Returns the top-n combos over *all* evaluated nodes, which become the query
templates handed to the SQL Query Generation component.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.config import BudgetProfile
from repro.core.template import one_hot


class TemplatePredictor:
    """Ridge regression over one-hot combo encodings (optimization O2)."""

    def __init__(self, universe: tuple[str, ...], alpha: float = 0.5):
        self.universe = universe
        self.alpha = alpha
        self._w: np.ndarray | None = None

    def fit(self, combos: list, scores: list[float]) -> "TemplatePredictor":
        X = np.vstack([one_hot(c, self.universe) for c in combos])
        X = np.hstack([X, np.ones((X.shape[0], 1))])
        y = np.asarray(scores, dtype=float)
        d = X.shape[1]
        reg = self.alpha * np.eye(d)
        reg[-1, -1] = 0.0
        self._w = np.linalg.solve(X.T @ X + reg, X.T @ y)
        return self

    def predict(self, combos: list) -> np.ndarray:
        X = np.vstack([one_hot(c, self.universe) for c in combos])
        X = np.hstack([X, np.ones((X.shape[0], 1))])
        return X @ self._w


@dataclass
class QTIStats:
    n_nodes_evaluated: int = 0
    n_nodes_predicted_only: int = 0
    layer_sizes: list[int] = field(default_factory=list)


def identify_templates(attrs: tuple[str, ...], effectiveness, budget: BudgetProfile,
                       *, n_templates: int, seed: int = 0,
                       use_predictor: bool = True
                       ) -> tuple[list[tuple[str, ...]], QTIStats]:
    """Beam-search the combo tree; ``effectiveness(combo) -> score`` (higher
    = better) is the node evaluation — the short in-pool proxy search in the
    full pipeline. Returns (top-n combos sorted attr-wise, stats)."""
    attrs = tuple(attrs)
    beta = budget.qti_beam
    depth = min(budget.qti_depth, len(attrs))
    stats = QTIStats()
    scores: dict[tuple[str, ...], float] = {}

    def canon(c) -> tuple[str, ...]:
        return tuple(a for a in attrs if a in set(c))

    def evaluate(combo: tuple[str, ...]) -> float:
        if combo not in scores:
            scores[combo] = float(effectiveness(combo))
            stats.n_nodes_evaluated += 1
        return scores[combo]

    # Layer 1: every singleton is evaluated (paper cost: |attr| · cost_p).
    layer = [canon((a,)) for a in attrs]
    for c in layer:
        evaluate(c)
    stats.layer_sizes.append(len(layer))
    beam = sorted(layer, key=lambda c: -scores[c])[:beta]

    predictor = TemplatePredictor(attrs)
    for _ in range(2, depth + 1):
        children: list[tuple[str, ...]] = []
        seen = set(scores)
        for node in beam:
            for a in attrs:
                if a in node:
                    continue
                child = canon((*node, a))
                if child not in seen:
                    children.append(child)
                    seen.add(child)
        if not children:
            break
        if use_predictor and len(children) > beta:
            predictor.fit(list(scores.keys()), list(scores.values()))
            pred = predictor.predict(children)
            stats.n_nodes_predicted_only += len(children) - beta
            order = np.argsort(-pred)[:beta]
            children = [children[i] for i in order]
        for c in children:
            evaluate(c)
        stats.layer_sizes.append(len(children))
        beam = sorted(children, key=lambda c: -scores[c])[:beta]

    top = sorted(scores.items(), key=lambda t: -t[1])[:n_templates]
    return [c for c, _ in top], stats
