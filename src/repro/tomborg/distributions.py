"""Target correlation-matrix samplers for Tomborg (step 1).

A user names a distribution; we sample pairwise entries, symmetrise,
and project to the nearest valid correlation matrix (PSD with unit
diagonal) by eigenvalue clipping + diagonal rescaling — sampled entry
matrices are almost never PSD as-is.
"""
from __future__ import annotations

import numpy as np

DISTRIBUTIONS = ("uniform", "sparse-low", "dense-high", "block")


def nearest_correlation(a: np.ndarray, eps: float = 1e-8) -> np.ndarray:
    """Project a symmetric matrix to a valid correlation matrix.

    Eigenvalue clipping at ``eps`` followed by rescaling to unit
    diagonal. One pass is enough for benchmark purposes (the result is
    exactly PSD and unit-diagonal; off-diagonal entries shift slightly —
    Tomborg treats the projected matrix as the target).
    """
    a = (a + a.T) / 2.0
    vals, vecs = np.linalg.eigh(a)
    vals = np.clip(vals, eps, None)
    b = (vecs * vals) @ vecs.T
    d = np.sqrt(np.diag(b))
    c = b / np.outer(d, d)
    np.fill_diagonal(c, 1.0)
    return c


def sample_target(
    name: str, n: int, seed: int = 0, block_size: int = 8
) -> np.ndarray:
    """Sample a target correlation matrix C of size n×n.

    - ``uniform``:    entries ~ U(−0.3, 0.9);
    - ``sparse-low``: entries ~ Beta(0.5, 3) — mostly near 0, network
                      edges are rare at any useful β (pruning's best case);
    - ``dense-high``: entries ~ Beta(5, 1.5) — mostly high, almost every
                      cell is an edge (pruning's worst case);
    - ``block``:      community structure — high inside blocks of
                      ``block_size``, low across (mixed regime).
    """
    g = np.random.default_rng(seed)
    if name == "uniform":
        raw = g.uniform(-0.3, 0.9, size=(n, n))
    elif name == "sparse-low":
        raw = g.beta(0.5, 3.0, size=(n, n))
    elif name == "dense-high":
        raw = g.beta(5.0, 1.5, size=(n, n))
    elif name == "block":
        raw = g.uniform(-0.1, 0.15, size=(n, n))
        for lo in range(0, n, block_size):
            hi = min(lo + block_size, n)
            raw[lo:hi, lo:hi] = g.uniform(0.6, 0.95, size=(hi - lo, hi - lo))
    else:
        raise ValueError(
            f"unknown target distribution {name!r}; expected one of {DISTRIBUTIONS}"
        )
    np.fill_diagonal(raw, 1.0)
    return nearest_correlation(raw)
