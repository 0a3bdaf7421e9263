"""Exact, vectorised stationary AR(1) sampling (the image ships no scipy).

``x_t = rho * x_{t-1} + sqrt(1 - rho^2) * eps_t`` with ``x_0 ~ N(0, 1)``
so the marginal is standard normal at every ``t`` and the autocorrelation
at lag ``L`` is ``rho^L``.  Computed chunk-wise with the scaling identity
``x_{t0+j} = rho^j * (x_{t0} + c * sum_{i<=j} eps_i * rho^{-i})`` — chunk
length is bounded so ``rho^{-i}`` never overflows; a test pins this
against the naive per-element recursion.
"""
from __future__ import annotations

import math

import numpy as np

__all__ = ["ar1", "ar1_naive"]


def _chunk_len(rho: float) -> int:
    # Keep rho**-m below e**600 (float64 overflows near e**709).
    if rho >= 1.0 - 1e-12:
        return 4096
    return max(1, min(4096, int(600.0 / -math.log(rho))))


def ar1(n: int, rho: float, *, seed: int | tuple = 0) -> np.ndarray:
    """Sample ``n`` points of a stationary N(0,1) AR(1) with parameter ``rho``."""
    if not 0.0 <= rho < 1.0:
        raise ValueError(f"rho must be in [0, 1), got {rho}")
    rng = np.random.default_rng(seed)
    if n <= 0:
        return np.empty(0, dtype=np.float64)
    out = np.empty(n, dtype=np.float64)
    out[0] = rng.standard_normal()
    if rho < 1e-8:
        # Effectively white noise; the carried term rho*x_{t-1} is below
        # float64 noise and the scaling identity would under/overflow.
        if n > 1:
            out[1:] = math.sqrt(1.0 - rho * rho) * rng.standard_normal(n - 1)
            out[1] += rho * out[0]
        return out
    c = math.sqrt(1.0 - rho * rho)
    m = _chunk_len(rho)
    pos = 1
    while pos < n:
        j = np.arange(1, min(m, n - pos) + 1, dtype=np.float64)
        eps = rng.standard_normal(len(j))
        inner = np.cumsum(eps * rho**-j)
        out[pos : pos + len(j)] = rho**j * (out[pos - 1] + c * inner)
        pos += len(j)
    return out


def ar1_naive(n: int, rho: float, *, seed: int | tuple = 0) -> np.ndarray:
    """Reference per-element recursion (test oracle for :func:`ar1`)."""
    rng = np.random.default_rng(seed)
    if n <= 0:
        return np.empty(0, dtype=np.float64)
    out = np.empty(n, dtype=np.float64)
    out[0] = rng.standard_normal()
    c = math.sqrt(1.0 - rho * rho)
    for t in range(1, n):
        out[t] = rho * out[t - 1] + c * rng.standard_normal()
    return out
