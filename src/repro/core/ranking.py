"""Ranking-ensemble helpers (paper §6.2–6.3).

RIFS ranks the union of real and injected features with a nu-weighted
combination of Random-Forest importances and ℓ2,1 sparse-regression
weights. Raw scores from the two models live on incomparable scales, so
each is first converted to a normalized rank in [0, 1] (1 = best) before
the convex combination.
"""
from __future__ import annotations

import numpy as np

from repro.selectors.embedded import random_forest_scores
from repro.selectors.sparse_regression import sparse_regression_scores

__all__ = ["normalized_rank", "ensemble_scores"]


def normalized_rank(scores: np.ndarray) -> np.ndarray:
    """Map scores to [0, 1] by rank; ties share the average rank."""
    s = np.asarray(scores, dtype=float)
    order = np.argsort(s, kind="stable")
    ranks = np.empty(len(s))
    ranks[order] = np.arange(len(s), dtype=float)
    # average ranks over ties so identical scores get identical ranks
    for v in np.unique(s):
        m = s == v
        if m.sum() > 1:
            ranks[m] = ranks[m].mean()
    return ranks / max(1, len(s) - 1)


def ensemble_scores(X: np.ndarray, y: np.ndarray, task: str, nu: float = 0.5,
                    seed: int = 0) -> np.ndarray:
    """nu * rank(RF importances) + (1 - nu) * rank(l21 row norms)."""
    rf = random_forest_scores(X, y, task, seed=seed)
    sr = sparse_regression_scores(X, y, task)
    return nu * normalized_rank(rf) + (1.0 - nu) * normalized_rank(sr)
