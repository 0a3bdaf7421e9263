"""Sample-budget allocation across strata.

Implements Proposition 1's optimal allocation with perfect information,
the sample-based estimate used by ``GetAlloc`` (Algorithm 2), and the
defensive mixing of ``N1/K`` guaranteed samples per stratum with the
``N2``-weighted dynamic allocation.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "optimal_allocation",
    "optimal_expected_mse",
    "stratum_stats",
    "estimated_allocation",
    "mix_defensive",
]


def optimal_allocation(
    d_sizes: np.ndarray,
    p: np.ndarray,
    sigma: np.ndarray,
    *,
    n1: float,
    n2: float,
    k: int,
) -> np.ndarray:
    """Proposition 1: the fraction of ``N2`` to allocate per stratum.

    ``a*_tk = |D_tk| sqrt(p_tk) sigma_tk / ((N2/N) * sum_j |D_tj|
    sqrt(p_tj) sigma_tj) - N1 / (N2 K)``.  The result sums to 1 and can
    be negative when the defensive floor already over-serves a stratum.
    """
    d_sizes = np.asarray(d_sizes, dtype=np.float64)
    w = d_sizes * np.sqrt(np.asarray(p, dtype=np.float64)) * np.asarray(
        sigma, dtype=np.float64
    )
    n = n1 + n2
    if w.sum() <= 0:
        raise ValueError("optimal allocation undefined: all strata have zero weight")
    return w / ((n2 / n) * w.sum()) - n1 / (n2 * k)


def optimal_expected_mse(
    d_sizes: np.ndarray,
    p: np.ndarray,
    sigma: np.ndarray,
    *,
    n1: float,
    n2: float,
) -> float:
    """Proposition 2: expected MSE of the estimator under ``a*``.

    Evaluated in the closed form ``(1 / (N p_all^2)) * (sum_k |D_tk|
    sqrt(p_tk) sigma_tk)^2`` with ``p_all = sum_j |D_tj| p_tj``.
    """
    d_sizes = np.asarray(d_sizes, dtype=np.float64)
    p = np.asarray(p, dtype=np.float64)
    sigma = np.asarray(sigma, dtype=np.float64)
    n = n1 + n2
    p_all = float((d_sizes * p).sum())
    if p_all <= 0:
        raise ValueError("expected MSE undefined: no stratum has positive rate")
    s = float((d_sizes * np.sqrt(p) * sigma).sum())
    return s * s / (n * p_all * p_all)


def stratum_stats(
    f: np.ndarray, pred: np.ndarray, strata: np.ndarray, k: int
) -> dict[str, np.ndarray]:
    """Per-stratum sample statistics from drawn samples (GetAlloc lines 7-11).

    Returns ``n`` (samples drawn), ``n_pos`` (predicate-matching), ``p_hat``,
    ``mu_hat`` (mean statistic over matching samples, 0 when none), and
    ``sigma_hat`` (sample std over matching samples, 0 when fewer than 2) —
    the paper's explicit guard clauses for empty strata.
    """
    f = np.asarray(f, dtype=np.float64)
    pred = np.asarray(pred, dtype=bool)
    strata = np.asarray(strata)
    n = np.bincount(strata, minlength=k).astype(np.float64)
    n_pos = np.bincount(strata[pred], minlength=k).astype(np.float64)
    sum_f = np.bincount(strata[pred], weights=f[pred], minlength=k)
    sum_f2 = np.bincount(strata[pred], weights=f[pred] ** 2, minlength=k)
    with np.errstate(invalid="ignore", divide="ignore"):
        p_hat = np.where(n > 0, n_pos / np.maximum(n, 1), 0.0)
        mu_hat = np.where(n_pos > 0, sum_f / np.maximum(n_pos, 1), 0.0)
        var = np.where(
            n_pos > 1,
            np.maximum(sum_f2 - n_pos * mu_hat**2, 0.0) / np.maximum(n_pos - 1, 1),
            0.0,
        )
    return {
        "n": n,
        "n_pos": n_pos,
        "p_hat": p_hat,
        "mu_hat": mu_hat,
        "sigma_hat": np.sqrt(var),
    }


def estimated_allocation(
    d_sizes: np.ndarray, p_hat: np.ndarray, sigma_hat: np.ndarray
) -> np.ndarray | None:
    """Allocation estimate ``a_{t-1,k}`` from previous-segment samples.

    ``w_hat_k = sqrt(p_hat_k) |D_k| / |D|``; ``a_k = w_hat_k sigma_hat_k /
    sum_j w_hat_j sigma_hat_j`` (GetAlloc lines 11-13).  Returns ``None``
    when every stratum has zero weight (no matching samples anywhere, or
    all sample stds are 0) — the caller then keeps its previous EWMA
    state rather than folding in an uninformative observation.
    """
    d_sizes = np.asarray(d_sizes, dtype=np.float64)
    if d_sizes.sum() <= 0:
        return None
    w_hat = np.sqrt(np.asarray(p_hat, dtype=np.float64)) * d_sizes / d_sizes.sum()
    weight = w_hat * np.asarray(sigma_hat, dtype=np.float64)
    total = weight.sum()
    if total <= 0:
        return None
    return weight / total


def mix_defensive(alloc: np.ndarray, *, n1: float, n2: float, k: int) -> np.ndarray:
    """Final per-stratum budget fractions ``(N1/K + N2 a_k) / N``.

    Guarantees every stratum at least the defensive floor ``N1/(K N)``
    regardless of how extreme the dynamic allocation is; sums to 1.
    """
    n = n1 + n2
    return (n1 / k + n2 * np.asarray(alloc, dtype=np.float64)) / n
