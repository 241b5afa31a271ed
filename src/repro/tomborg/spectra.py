"""Real-valued orthonormal DFT pair (the paper's inverse-DFT variant).

The classic inverse DFT maps complex coefficient space to complex
signal space. Tomborg needs a *real→real* pair so that step (2) can
sample real coefficient vectors and step (3) lands in real time series
while preserving distances. We build the standard orthonormal real
Fourier basis: for x ∈ R^L and rfft coefficients f_0 … f_{⌊L/2⌋}
(``norm="ortho"``), the real coefficient vector is

    c = [ f_0.re, √2·f_1.re, −√2·f_1.im, √2·f_2.re, −√2·f_2.im, …,
          (f_{L/2}.re  — only for even L, not doubled) ]

This map is linear and orthogonal (a change of basis), so it is an
isometry: ‖c‖ = ‖x‖ and ⟨c_x, c_y⟩ = ⟨x, y⟩ — the property the paper
proves and relies on ("DFT preserves the distance between coefficients
and the original time series"). Property tests verify isometry,
round-tripping and Parseval to machine precision.
"""
from __future__ import annotations

import numpy as np


def real_dft(x: np.ndarray) -> np.ndarray:
    """Real series -> real orthonormal Fourier coefficients (same length).

    Works on the last axis; accepts (..., L).
    """
    x = np.asarray(x, dtype=np.float64)
    length = x.shape[-1]
    f = np.fft.rfft(x, norm="ortho")
    c = np.empty_like(x)
    c[..., 0] = f[..., 0].real
    if length % 2 == 0:
        mid = f[..., 1:-1]
        c[..., 1:-1:2] = np.sqrt(2.0) * mid.real
        c[..., 2:-1:2] = -np.sqrt(2.0) * mid.imag
        c[..., -1] = f[..., -1].real
    else:
        mid = f[..., 1:]
        c[..., 1::2] = np.sqrt(2.0) * mid.real
        c[..., 2::2] = -np.sqrt(2.0) * mid.imag
    return c


def real_idft(c: np.ndarray) -> np.ndarray:
    """Real orthonormal Fourier coefficients -> real series (the inverse).

    The paper's "real-value variant of the inverse-DFT": complex→real is
    replaced by real→real, with the isometry preserved.
    """
    c = np.asarray(c, dtype=np.float64)
    length = c.shape[-1]
    nf = length // 2 + 1
    f = np.zeros(c.shape[:-1] + (nf,), dtype=np.complex128)
    f[..., 0] = c[..., 0]
    if length % 2 == 0:
        f[..., 1:-1] = (c[..., 1:-1:2] - 1j * c[..., 2:-1:2]) / np.sqrt(2.0)
        f[..., -1] = c[..., -1]
    else:
        f[..., 1:] = (c[..., 1::2] - 1j * c[..., 2::2]) / np.sqrt(2.0)
    return np.fft.irfft(f, n=length, norm="ortho")


def energy_profile(length: int, alpha: float) -> np.ndarray:
    """Per-coefficient scale with tunable energy concentration.

    ``alpha = 0`` gives a flat spectrum (energy spread across all
    frequencies — the worst case for frequency-truncating methods);
    larger ``alpha`` concentrates energy in the low frequencies
    (their best case). Scales follow (1 + k)^(−alpha/2) over the
    *frequency* index of each real coefficient, normalised to unit
    total energy. The DC scale is zeroed so generated series are
    exactly zero-mean.
    """
    freq_of_coef = np.empty(length, dtype=np.float64)
    freq_of_coef[0] = 0.0
    if length % 2 == 0:
        freq_of_coef[1:-1] = np.repeat(np.arange(1, length // 2), 2)
        freq_of_coef[-1] = length // 2
    else:
        freq_of_coef[1:] = np.repeat(np.arange(1, length // 2 + 1), 2)
    s = (1.0 + freq_of_coef) ** (-alpha / 2.0)
    s[0] = 0.0
    return s / np.sqrt((s * s).sum())
