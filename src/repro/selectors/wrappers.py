"""Wrapper-model selectors: forward selection, backward elimination, RFE.

These drive the learning model directly (paper §5): forward selection
greedily adds the feature whose addition most improves holdout score,
backward elimination greedily removes, and RFE repeatedly drops the
lowest-importance fraction using the Random-Forest ranker (the paper uses
the RF ranker for all three, §7). They are the slow-but-strong baselines
of Tables 1 and 6 — cost is O(d) model fits per step.
"""
from __future__ import annotations

import time

import numpy as np

from repro.ml.evaluate import Evaluator
from repro.selectors.base import SelectionResult
from repro.selectors.embedded import random_forest_scores

__all__ = ["forward_selection", "backward_elimination", "rfe"]


def forward_selection(ev: Evaluator, max_features: int = 24,
                      patience: int = 2, candidate_pool: int | None = 64,
                      seed: int = 0) -> SelectionResult:
    """Greedy add; stop after ``patience`` consecutive non-improving adds.

    ``candidate_pool`` pre-truncates the search to the top-N RF-ranked
    features when d is large — the literal O(d) scan per add is what makes
    the paper's forward-selection runtimes hit 10^4–10^5 seconds; capping
    the pool preserves the method's behaviour (greedy, model-driven,
    slowest-but-strong) at container scale.
    """
    t0 = time.perf_counter()
    d = ev.X.shape[1]
    if candidate_pool is not None and d > candidate_pool:
        imp = random_forest_scores(ev.X, ev.y, ev.task, seed)
        remaining = list(np.argsort(imp)[::-1][:candidate_pool])
    else:
        remaining = list(range(d))
    chosen: list[int] = []
    best_total = ev.score([])
    best_set = []
    bad = 0
    while remaining and len(chosen) < max_features and bad < patience:
        scores = [(ev.score(chosen + [j]), j) for j in remaining]
        s, j = max(scores)
        chosen.append(j)
        remaining.remove(j)
        if s > best_total:
            best_total, best_set, bad = s, list(chosen), 0
        else:
            bad += 1
    return SelectionResult(np.array(sorted(best_set), dtype=int), best_total,
                           time.perf_counter() - t0, ev.n_evals)


def backward_elimination(ev: Evaluator, min_features: int = 2,
                         max_start: int = 48, max_rounds: int = 12,
                         seed: int = 0) -> SelectionResult:
    """Greedy remove, starting from the top-``max_start`` RF-ranked features
    (a full backward pass over hundreds of features is quadratic in model
    fits; the paper's own runtimes show this is the most expensive method).
    ``max_rounds`` bounds the elimination rounds at container scale."""
    t0 = time.perf_counter()
    d = ev.X.shape[1]
    if d > max_start:
        imp = random_forest_scores(ev.X, ev.y, ev.task, seed)
        current = list(np.argsort(imp)[::-1][:max_start])
    else:
        current = list(range(d))
    best_total = ev.score(current)
    best_set = list(current)
    improved, rounds = True, 0
    while improved and len(current) > min_features and rounds < max_rounds:
        improved = False
        rounds += 1
        scores = [(ev.score([c for c in current if c != j]), j) for j in current]
        s, j = max(scores)
        if s >= best_total:
            current.remove(j)
            best_total, best_set, improved = s, list(current), True
    return SelectionResult(np.array(sorted(best_set), dtype=int), best_total,
                           time.perf_counter() - t0, ev.n_evals)


def rfe(ev: Evaluator, drop_frac: float = 0.5, min_features: int = 2,
        seed: int = 0) -> SelectionResult:
    """Recursive feature elimination: refit the RF ranker on the surviving
    set, drop the weakest ``drop_frac``, keep the best holdout subset."""
    t0 = time.perf_counter()
    current = np.arange(ev.X.shape[1])
    best_total, best_set = -np.inf, current
    while len(current) >= min_features:
        s = ev.score(current)
        if s > best_total:
            best_total, best_set = s, current.copy()
        if len(current) == min_features:
            break
        imp = random_forest_scores(ev.X[:, current], ev.y, ev.task, seed)
        keep = max(min_features, int(len(current) * (1 - drop_frac)))
        current = current[np.argsort(imp)[::-1][:keep]]
    return SelectionResult(np.sort(best_set).astype(int), best_total,
                           time.perf_counter() - t0, ev.n_evals)
