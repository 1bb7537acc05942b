"""Goodman–Kruskal gamma correlation with a permutation p-value.

The paper (Eq. 4) uses gamma between a matcher's reported confidences and
the correctness of the corresponding decisions to measure *resolution* —
whether a matcher is more confident when correct. scipy is unavailable
offline, so both the statistic and its significance test are implemented
here from first principles.
"""
from __future__ import annotations

import numpy as np

__all__ = ["goodman_kruskal_gamma", "gamma_pvalue", "gamma_with_pvalue"]


def goodman_kruskal_gamma(x: np.ndarray, y: np.ndarray) -> float:
    """Gamma = (C - D) / (C + D) over concordant/discordant pairs.

    Ties (in either variable) are excluded, per the classic definition.
    Returns 0.0 when there are no untied pairs (constant input), matching
    the convention that a matcher with uniform confidence has no
    resolution signal.
    """
    x = np.asarray(x, dtype=float)
    y = np.asarray(y, dtype=float)
    if x.shape != y.shape:
        raise ValueError(f"shape mismatch: {x.shape} vs {y.shape}")
    n = x.size
    if n < 2:
        return 0.0
    # Pairwise sign comparison; O(n^2) but n is a matcher's decision count
    # (tens to low hundreds), so this is microseconds in vectorized form.
    dx = np.sign(x[:, None] - x[None, :])
    dy = np.sign(y[:, None] - y[None, :])
    iu = np.triu_indices(n, k=1)
    prod = dx[iu] * dy[iu]
    concordant = int(np.sum(prod > 0))
    discordant = int(np.sum(prod < 0))
    total = concordant + discordant
    if total == 0:
        return 0.0
    return (concordant - discordant) / total


def gamma_pvalue(
    x: np.ndarray,
    y: np.ndarray,
    *,
    n_perm: int = 200,
    seed: int = 0,
) -> float:
    """Two-sided permutation p-value for gamma(x, y).

    Permutes ``y`` (correctness) relative to ``x`` (confidence) and counts
    permutations whose |gamma| meets or exceeds the observed |gamma|. The
    "+1" smoothing keeps the estimate conservative and never exactly 0.
    """
    x = np.asarray(x, dtype=float)
    y = np.asarray(y, dtype=float)
    obs = abs(goodman_kruskal_gamma(x, y))
    rng = np.random.default_rng(seed)
    hits = 0
    yp = y.copy()
    for _ in range(n_perm):
        rng.shuffle(yp)
        if abs(goodman_kruskal_gamma(x, yp)) >= obs - 1e-12:
            hits += 1
    return (hits + 1) / (n_perm + 1)


def gamma_with_pvalue(
    x: np.ndarray, y: np.ndarray, *, n_perm: int = 200, seed: int = 0
) -> tuple[float, float]:
    """Convenience wrapper returning ``(gamma, p_value)``."""
    return goodman_kruskal_gamma(x, y), gamma_pvalue(x, y, n_perm=n_perm, seed=seed)
