"""Pure numpy kernels for basic-window sketches and Eq.-1 evaluation.

Everything here is deliberately *honest about algorithmic cost*: a query
window is always aggregated from its n_s basic-window statistics (the
TSUBASA evaluation model for ad-hoc windows), never from cross-window
prefix sums. Both the TSUBASA baseline and Dangoron's landing
evaluations share these kernels, so wall-clock differences between the
engines reflect how many (pair, window) cells each evaluates — the
quantity the paper's pruning reduces — not implementation asymmetry.
"""
from __future__ import annotations

import numpy as np
from numpy.lib.stride_tricks import as_strided

from repro.tsio.validation import SlidingSpec


# --------------------------------------------------------------------------
# Per-series basic-window statistics
# --------------------------------------------------------------------------

def bw_means_stds(X: np.ndarray, bw: int) -> tuple[np.ndarray, np.ndarray]:
    """Per-basic-window mean and population std of each series.

    X: (n, L) with L a multiple of ``bw``. Returns (means, stds), each
    (n, L // bw).
    """
    n, length = X.shape
    if length % bw != 0:
        raise ValueError(f"series length {length} not a multiple of bw={bw}")
    xb = X.reshape(n, length // bw, bw)
    means = xb.mean(axis=2)
    stds = xb.std(axis=2)  # population (ddof=0); Eq. 1 is exact with these
    return means, stds


def bw_centered(X: np.ndarray, bw: int) -> np.ndarray:
    """Series reshaped to (n, n_bw, B) with each basic window mean-centred."""
    n, length = X.shape
    xb = X.reshape(n, length // bw, bw).astype(np.float64)
    return xb - xb.mean(axis=2, keepdims=True)


def pair_bw_cov(xc_i: np.ndarray, xc_j: np.ndarray) -> np.ndarray:
    """Pairwise per-basic-window population covariance between two blocks.

    xc_i: (ni, n_bw, B) centred, xc_j: (nj, n_bw, B) centred.
    Returns q of shape (ni, nj, n_bw): q[p, r, b] = cov of series p (block
    i) and series r (block j) inside basic window b.
    """
    bw = xc_i.shape[2]
    return np.einsum("ibk,jbk->ijb", xc_i, xc_j, optimize=True) / bw


# --------------------------------------------------------------------------
# Window gathers (the honest O(n_s)-per-cell aggregation)
# --------------------------------------------------------------------------

def sliding_window_sums(arr: np.ndarray, spec: SlidingSpec) -> np.ndarray:
    """Sum ``arr`` over each query window's basic windows, for all windows.

    arr: (..., n_bw). Returns (..., W) where W = spec.n_windows. Cost is
    Θ(cells × n_s): a strided view over the basic windows of each window
    is materialised by the reduction — no cross-window sharing.
    """
    lead = arr.shape[:-1]
    flat = np.ascontiguousarray(arr.reshape(-1, arr.shape[-1]))
    w, m, n_s = spec.n_windows, spec.m, spec.n_s
    sub = flat[:, spec.bw0 : spec.bw0 + (w - 1) * m + n_s]
    s0, s1 = sub.strides
    view = as_strided(sub, shape=(flat.shape[0], w, n_s), strides=(s0, s1 * m, s1))
    return view.sum(axis=2).reshape(*lead, w)


def series_window_aggregates(
    means: np.ndarray, stds: np.ndarray, spec: SlidingSpec
) -> tuple[np.ndarray, np.ndarray]:
    """Per-series, per-window aggregates needed by Eq. 1.

    Returns (mbar, ss), each (n, W):
      mbar[s, w] = mean over the window's basic windows of the bw means
                   (= the exact window mean, since all bws are equal-size);
      ss[s, w]   = Σ_j (σ²[j] + (m[j] − mbar)²)
                 = Σ_j σ²[j] + Σ_j m[j]² − n_s·mbar²
                   (n_s × the exact window population variance).
    """
    n_s = spec.n_s
    msum = sliding_window_sums(means, spec)
    m2sum = sliding_window_sums(means * means, spec)
    s2sum = sliding_window_sums(stds * stds, spec)
    mbar = msum / n_s
    ss = s2sum + m2sum - n_s * mbar * mbar
    return mbar, ss


def eval_all_windows(
    q: np.ndarray,
    means_i: np.ndarray,
    means_j: np.ndarray,
    mbar_i: np.ndarray,
    mbar_j: np.ndarray,
    ss_i: np.ndarray,
    ss_j: np.ndarray,
    spec: SlidingSpec,
) -> np.ndarray:
    """Exact Eq.-1 correlation of every (pair, window) cell of a block pair.

    q: (ni, nj, n_bw) pairwise bw covariances; means_*: (n*, n_bw);
    mbar_*/ss_*: (n*, W) from ``series_window_aggregates``.
    Returns corr of shape (ni, nj, W); cells with a zero-variance side
    are NaN (correlation undefined), mirroring ``np.corrcoef``.
    """
    n_s = spec.n_s
    qsum = sliding_window_sums(q, spec)                       # (ni, nj, W)
    mm = np.einsum("ib,jb->ijb", means_i, means_j, optimize=True)
    mmsum = sliding_window_sums(mm, spec)                     # (ni, nj, W)
    num = qsum + mmsum - n_s * mbar_i[:, None, :] * mbar_j[None, :, :]
    den2 = ss_i[:, None, :] * ss_j[None, :, :]
    with np.errstate(invalid="ignore", divide="ignore"):
        corr = np.where(den2 > 0, num / np.sqrt(den2), np.nan)
    return corr


def fuse_pair_terms(q: np.ndarray, means_i: np.ndarray, means_j: np.ndarray) -> np.ndarray:
    """Per-pair fused sketch g_j = q_j + m_x[j]·m_y[j], flattened.

    Eq. 1's numerator is Σ_j g_j − n_s·M̄_x·M̄_y, so fusing once at tile
    setup lets every window evaluation do a single gather+sum. Both
    engines build and use this identically. Shape (ni·nj, n_bw).
    """
    g = np.einsum("ib,jb->ijb", means_i, means_j, optimize=True)
    g += q
    return g.reshape(-1, q.shape[2])


def eval_at_window(
    rows: np.ndarray,
    w: int,
    qmm2: np.ndarray,
    mbar_i: np.ndarray,
    mbar_j: np.ndarray,
    ss_i: np.ndarray,
    ss_j: np.ndarray,
    pi: np.ndarray,
    pj: np.ndarray,
    spec: SlidingSpec,
) -> np.ndarray:
    """Exact Eq.-1 correlation of the listed pair rows at one window.

    This is THE shared evaluation kernel of the sweep engines: the
    TSUBASA baseline calls it with every pair row at every window,
    Dangoron only with the rows its jump structure wakes at ``w``. Both
    therefore pay the identical Θ(n_s)-per-cell aggregation cost and the
    same numpy constants — the wall-clock ratio between the engines
    measures pruning, not implementation skew.

    rows: (c,) flat (ni·nj) pair-row indices into the fused sketch from
    ``fuse_pair_terms``; pi/pj: (ni·nj,) local series index per flat row.
    """
    n_s = spec.n_s
    a = spec.bw0 + w * spec.m
    gsum = qmm2[rows, a : a + n_s].sum(axis=1)
    si, sj = pi[rows], pj[rows]
    num = gsum - n_s * mbar_i[si, w] * mbar_j[sj, w]
    den2 = ss_i[si, w] * ss_j[sj, w]
    with np.errstate(invalid="ignore", divide="ignore"):
        return np.where(den2 > 0, num / np.sqrt(den2), np.nan)


def eval_cells(
    pair_rows: np.ndarray,
    wins: np.ndarray,
    q2: np.ndarray,
    mm2: np.ndarray,
    mbar_i: np.ndarray,
    mbar_j: np.ndarray,
    ss_i: np.ndarray,
    ss_j: np.ndarray,
    pi: np.ndarray,
    pj: np.ndarray,
    spec: SlidingSpec,
) -> np.ndarray:
    """Exact Eq.-1 correlation for an irregular set of (pair, window) cells.

    Used by Dangoron's frontier: only the cells the jump structure lands
    on are evaluated, at the same Θ(n_s)-per-cell cost as the full kernel.

    pair_rows: (c,) row index into the flattened (ni·nj) pair axis of
    q2/mm2; wins: (c,) sliding-window index per cell; q2/mm2:
    (ni·nj, n_bw) flattened pairwise bw cov / mean-product; pi/pj:
    (ni·nj,) local series index of every flattened pair row
    (pi = repeat(arange(ni), nj), pj = tile(arange(nj), ni)).
    """
    n_s = spec.n_s
    a = spec.bw0 + wins * spec.m                              # first bw of each cell
    idx = a[:, None] + np.arange(n_s)[None, :]                # (c, n_s)
    qrows = q2[pair_rows]
    mmrows = mm2[pair_rows]
    qsum = np.take_along_axis(qrows, idx, axis=1).sum(axis=1)
    mmsum = np.take_along_axis(mmrows, idx, axis=1).sum(axis=1)
    si, sj = pi[pair_rows], pj[pair_rows]
    num = qsum + mmsum - n_s * mbar_i[si, wins] * mbar_j[sj, wins]
    den2 = ss_i[si, wins] * ss_j[sj, wins]
    with np.errstate(invalid="ignore", divide="ignore"):
        return np.where(den2 > 0, num / np.sqrt(den2), np.nan)


# --------------------------------------------------------------------------
# Reference (non-sketch) correlation, for tests and the naive baseline
# --------------------------------------------------------------------------

def exact_window_corr(X: np.ndarray, spec: SlidingSpec) -> np.ndarray:
    """Ground-truth all-pairs correlation per window, straight from raw data.

    Returns (N, N, W). Cost Θ(N²·l) per window — the naive baseline's
    model (no sketch reuse across windows).
    """
    n = X.shape[0]
    out = np.empty((n, n, spec.n_windows), dtype=np.float64)
    for w in range(spec.n_windows):
        ws, we = spec.window_t_range(w)
        seg = X[:, ws:we]
        segc = seg - seg.mean(axis=1, keepdims=True)
        norms = np.sqrt((segc * segc).sum(axis=1))
        cov = segc @ segc.T
        den = np.outer(norms, norms)
        with np.errstate(invalid="ignore", divide="ignore"):
            out[:, :, w] = np.where(den > 0, cov / den, np.nan)
    return out
