"""RIFS — Random Injection Feature Selection (paper §6, Algorithms 1–3).

Algorithm 2 injects eta*d random features drawn from N(mu, Sigma) where
mu is the empirical mean *feature vector* (average of the columns of the
n x d matrix A) and Sigma the empirical covariance across features —
noise that "looks like" the input. Algorithm 1 ranks [A | N] with the
RF + sparse-regression ensemble k times with fresh noise, and scores each
real feature by the fraction of repeats in which it beat *every* injected
feature. Algorithm 3 sweeps an increasing threshold list over that
fraction, training the estimator per threshold, and stops when holdout
accuracy stops increasing monotonically.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.ranking import ensemble_scores
from repro.ml.evaluate import Evaluator
from repro.selectors.base import SelectionResult

__all__ = ["inject_random_features", "rifs_fractions", "rifs_select", "RIFSConfig"]


def inject_random_features(X: np.ndarray, eta: float = 0.2, seed: int = 0,
                           mode: str = "moment") -> np.ndarray:
    """Algorithm 2: t = ceil(eta * d) synthetic feature columns (n x t).

    ``moment`` draws from N(mu, Sigma) with the empirical column moments.
    Sigma = (1/d) Ac Ac^T is rank <= d, so a sample is generated as
    mu + Ac g / sqrt(d) with g ~ N(0, I_d) — exact, and never materializes
    the n x n covariance. Simple modes (normal/uniform/bernoulli) cover
    the easy regime of §6.1.
    """
    X = np.asarray(X, dtype=float)
    n, d = X.shape
    t = max(1, int(np.ceil(eta * d)))
    rng = np.random.default_rng(seed)
    if mode == "normal":
        return rng.normal(size=(n, t))
    if mode == "uniform":
        return rng.uniform(-1, 1, size=(n, t))
    if mode == "bernoulli":
        return rng.integers(0, 2, size=(n, t)).astype(float)
    if mode != "moment":
        raise ValueError(f"unknown injection mode {mode!r}")
    mu = X.mean(axis=1)  # (n,) typical feature vector
    Ac = X - mu[:, None]
    G = rng.normal(size=(d, t))
    return mu[:, None] + (Ac @ G) / np.sqrt(d)


@dataclass
class RIFSConfig:
    eta: float = 0.2
    k: int = 10
    nu: float = 0.5
    thresholds: tuple = (0.1, 0.2, 0.3, 0.4, 0.5, 0.6, 0.7, 0.8, 0.9, 1.0)
    injection_mode: str = "moment"
    seed: int = 0


def rifs_fractions(X: np.ndarray, y: np.ndarray, task: str,
                   cfg: RIFSConfig = RIFSConfig(),
                   rank_fn=ensemble_scores) -> np.ndarray:
    """Algorithm 1 core: r*[j] = fraction of the k injection rounds in
    which feature j ranked ahead of ALL injected random features.

    Features are standardized before moment-matching: on heterogeneous
    raw scales the empirical mean feature vector is dominated by the
    widest column, which makes every injected feature a near-copy of it —
    weak, mutually-correlated noise that real irrelevant features beat by
    default (no pruning power). The ranking ensemble is scale-free, so
    standardization changes nothing else.
    """
    X = np.asarray(X, dtype=float)
    std = X.std(axis=0)
    X = (X - X.mean(axis=0)) / np.where(std < 1e-12, 1.0, std)
    n, d = X.shape
    wins = np.zeros(d)
    for it in range(cfg.k):
        N = inject_random_features(X, cfg.eta, seed=cfg.seed * 1000 + it,
                                   mode=cfg.injection_mode)
        Xp = np.hstack([X, N])
        agg = rank_fn(Xp, y, task, nu=cfg.nu, seed=cfg.seed * 1000 + it)
        noise_max = agg[d:].max()
        wins += agg[:d] > noise_max
    return wins / cfg.k


def rifs_select(ev: Evaluator, cfg: RIFSConfig = RIFSConfig(),
                force_keep: np.ndarray | None = None,
                fractions: np.ndarray | None = None,
                stop_on_decrease: bool = False) -> SelectionResult:
    """Algorithm 3: sweep increasing tau over r*, training the estimator
    per threshold, and return the best-scoring subset.

    The paper stops the sweep at the first non-monotone accuracy and
    outputs the previous subset; since |T| is a small constant either
    way, the default here evaluates the whole grid and returns the argmax
    — strictly more robust to holdout noise at the same O(|T|) model
    fits. ``stop_on_decrease=True`` restores the literal Algorithm 3.

    ``force_keep`` columns (the user's base-table features in the ARDA
    pipeline) are excluded from pruning and present in every candidate.
    ``fractions`` may be precomputed (so jobs can reuse one Algorithm-1
    pass across sweeps); otherwise computed here.
    """
    t0 = time.perf_counter()
    if fractions is None:
        fractions = rifs_fractions(ev.X, ev.y, ev.task, cfg)
    fk = (np.asarray(force_keep, dtype=int)
          if force_keep is not None else np.empty(0, dtype=int))
    fk_set = set(fk.tolist())
    prev_score = -np.inf
    best_subset = fk
    best_score = -np.inf
    prev_sel: np.ndarray | None = None
    for tau in sorted(cfg.thresholds):
        sel = np.array(sorted(fk_set | set(np.nonzero(fractions >= tau)[0].tolist())),
                       dtype=int)
        if prev_sel is not None and np.array_equal(sel, prev_sel):
            continue  # same subset as the previous threshold — skip the fit
        prev_sel = sel
        s = ev.score(sel)
        if s > best_score:
            best_score, best_subset = s, sel
        if stop_on_decrease and s < prev_score:
            break  # literal Algorithm 3: stop at first non-monotone step
        prev_score = s
    return SelectionResult(best_subset, best_score, time.perf_counter() - t0,
                           ev.n_evals, extra={"fractions": fractions})
