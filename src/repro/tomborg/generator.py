"""Tomborg dataset generation (steps 2 and 3).

Coefficients are sampled iid Gaussian per frequency, correlated across
series with the symmetric square root of the target matrix C, scaled by
an energy-concentration profile, and mapped to time domain with the
real-valued inverse DFT. Because the transform is an isometry,
⟨X_i, X_j⟩ = ⟨c_i, c_j⟩, whose expectation is C_ij — so the realised
correlation matrix concentrates around the user's target, with a spread
controlled by the spectrum's effective degrees of freedom (flat spectrum
→ tight; concentrated → visibly drifting window correlations, the
regime that exercises Dangoron's jumping).
"""
from __future__ import annotations

import numpy as np

from repro.tomborg.distributions import sample_target
from repro.tomborg.spectra import energy_profile, real_idft


def sqrt_psd(c: np.ndarray, eps: float = 1e-10) -> np.ndarray:
    """Symmetric PSD square root via eigendecomposition."""
    vals, vecs = np.linalg.eigh(c)
    vals = np.clip(vals, 0.0, None)
    return (vecs * np.sqrt(vals + eps)) @ vecs.T


def generate(
    c_target: np.ndarray,
    length: int,
    alpha: float = 0.0,
    seed: int = 0,
) -> np.ndarray:
    """Generate an (N, length) panel whose correlation matrix ≈ C.

    ``alpha`` is the energy-concentration exponent (0 = flat spectrum,
    2 = strongly concentrated in low frequencies).
    """
    n = c_target.shape[0]
    g = np.random.default_rng(seed)
    coeffs = sqrt_psd(c_target) @ g.normal(size=(n, length))
    coeffs *= energy_profile(length, alpha)[None, :]
    return real_idft(coeffs)


def generate_named(
    name: str,
    n: int,
    length: int,
    alpha: float = 0.0,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Sample a named target distribution and generate its panel.

    Returns (X, C_target).
    """
    c = sample_target(name, n, seed=seed)
    return generate(c, length, alpha=alpha, seed=seed + 1), c


def generate_drifting(
    c_a: np.ndarray,
    c_b: np.ndarray,
    length: int,
    alpha: float = 0.0,
    seed: int = 0,
) -> np.ndarray:
    """Panel whose correlation structure drifts from C_a to C_b over time.

    X(t) = cos θ(t)·A(t) + sin θ(t)·B(t) with θ: 0 → π/2 and A, B
    independent panels targeting C_a and C_b. The instantaneous
    correlation interpolates cos²θ·C_a + sin²θ·C_b — a controlled
    stress test for the Eq.-2 bound's stationarity assumption.
    """
    xa = generate(c_a, length, alpha=alpha, seed=seed)
    xb = generate(c_b, length, alpha=alpha, seed=seed + 7919)
    theta = np.linspace(0.0, np.pi / 2.0, length)[None, :]
    return np.cos(theta) * xa + np.sin(theta) * xb
