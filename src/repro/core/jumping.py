"""Dangoron's jumping structure as a vectorized frontier kernel.

Per block-pair tile, every pair walks the sliding windows exactly as in
Fig. 2 of the paper:

  evaluate exact correlation at the current window (Eq. 1 from sketches)
    → if ≥ β: emit the value, advance one window (above-threshold cells
      must carry exact values, so they can never be skipped);
    → if < β: binary-search the smallest k with UB(k) ≥ β on the
      monotone Eq.-2 bound, certify windows w+1 … w+k−1 as below β
      (emit nothing — thresholded entries are zero), land at w+k and
      re-evaluate. If even UB(k_max) < β the pair is done for the rest
      of the range.

All pairs of the tile advance together ("frontier"), so each round is a
handful of vectorized numpy ops; the total number of exact evaluations —
the quantity the paper's pruning reduces — is counted and returned.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core import bounds
from repro.sketch import kernels
from repro.sketch.pair_sketch import pair_tile_arrays
from repro.tsio.validation import SlidingSpec

MODES = ("exact-ci", "worst-case")


@dataclass
class FrontierStats:
    """Work counters for one tile (or summed over tiles)."""

    cells: int = 0          # total (pair, window) cells in scope
    evals: int = 0          # exact Eq.-1 evaluations performed
    probes: int = 0         # O(1) bound probes during binary searches
    jumps: int = 0          # number of jump decisions taken
    jump_lengths: int = 0   # total windows certified-skipped by jumps
    emitted: int = 0        # cells ≥ β emitted

    def merge(self, other: "FrontierStats") -> None:
        for f in ("cells", "evals", "probes", "jumps", "jump_lengths", "emitted"):
            setattr(self, f, getattr(self, f) + getattr(other, f))


@dataclass
class TileResult:
    i: np.ndarray
    j: np.ndarray
    w: np.ndarray
    corr: np.ndarray
    stats: FrontierStats = field(default_factory=FrontierStats)


def frontier_query(tile: dict, spec: SlidingSpec, mode: str = "exact-ci") -> TileResult:
    """Run Dangoron over one block-pair sketch tile.

    ``tile`` is a payload from ``pair_sketch.load_pair_payload``. Returns
    the emitted (i, j, w, corr ≥ β) cells with global series ids and the
    work counters.
    """
    if mode not in MODES:
        raise ValueError(f"unknown bound mode {mode!r}; expected one of {MODES}")
    n_s, m, w_total, beta = spec.n_s, spec.m, spec.n_windows, spec.beta

    pi, pj, rows = pair_tile_arrays(tile)
    n_pairs = rows.size
    stats = FrontierStats(cells=n_pairs * w_total)
    if n_pairs == 0:
        empty = np.empty(0, dtype=np.int64)
        return TileResult(empty, empty, empty, np.empty(0), stats)

    means_i, stds_i = tile["means_i"], tile["stds_i"]
    means_j, stds_j = tile["means_j"], tile["stds_j"]
    q = tile["q"]
    n_bw = q.shape[2]
    mbar_i, ss_i = kernels.series_window_aggregates(means_i, stds_i, spec)
    mbar_j, ss_j = kernels.series_window_aggregates(means_j, stds_j, spec)
    qmm2 = kernels.fuse_pair_terms(q, means_i, means_j)
    ni, nj = means_i.shape[0], means_j.shape[0]
    pi_flat = np.repeat(np.arange(ni), nj)
    pj_flat = np.tile(np.arange(nj), ni)

    if mode == "exact-ci":
        # Per-pair monotone slack prefixes G (Σ(1 − c_i)): O(pairs·n_bw),
        # part of Dangoron's query cost (the baseline never needs them).
        # Computed on the kept pair rows only and kept flat; probes index
        # it directly so no rows are ever copied afterwards.
        cb_rows = bounds.bw_correlations(q, stds_i, stds_j).reshape(-1, n_bw)[rows]
        slack_width = n_bw + 1
        slack2 = np.empty((rows.size, slack_width))
        slack2[:, 0] = 0.0
        np.cumsum(1.0 - cb_rows, axis=1, out=slack2[:, 1:])
        slack_flat = slack2.reshape(-1)

    # Sweep the windows in order; each window has a "wake bucket" of the
    # pairs that must be exactly evaluated there (jump = land in a later
    # bucket). Both engines loop over the same W windows with the same
    # per-window kernel, so their per-cell numpy constants match and the
    # wall-clock ratio tracks cells evaluated.
    buckets: list[list[np.ndarray]] = [[] for _ in range(w_total)]
    buckets[0].append(np.arange(n_pairs))
    out_i: list[np.ndarray] = []
    out_j: list[np.ndarray] = []
    out_w: list[np.ndarray] = []
    out_c: list[np.ndarray] = []

    for w in range(w_total):
        parts = buckets[w]
        if not parts:
            continue
        act = parts[0] if len(parts) == 1 else np.concatenate(parts)
        c = kernels.eval_at_window(
            rows[act], w, qmm2, mbar_i, mbar_j, ss_i, ss_j,
            pi_flat, pj_flat, spec,
        )
        stats.evals += act.size
        emit = c >= beta  # NaN compares False: undefined cells emit nothing
        if emit.any():
            sel = act[emit]
            out_i.append(tile["ids_i"][pi[sel]])
            out_j.append(tile["ids_j"][pj[sel]])
            out_w.append(np.full(sel.size, w, dtype=np.int64))
            out_c.append(c[emit])
            stats.emitted += int(emit.sum())

        nxt = np.full(act.size, w + 1, dtype=np.int64)
        # Jump only from defined below-threshold cells; undefined ones
        # (zero-variance window) step by one — no bound can be anchored.
        jmp = (~emit) & ~np.isnan(c)
        kmax_scalar = w_total - 1 - w
        if jmp.any() and kmax_scalar >= 1:
            cj = c[jmp]
            kmax = np.full(cj.size, kmax_scalar, dtype=np.int64)
            if mode == "worst-case":
                k = bounds.worst_case_jump(cj, beta, m, n_s)
                k = np.minimum(k, kmax + 1)  # kmax+1 ⇒ done
                stats.probes += cj.size
            else:
                k = _binary_search_jump(
                    cj, w, kmax, slack_flat, slack_width, act[jmp], spec, stats
                )
            stats.jumps += int((k > 1).sum())
            stats.jump_lengths += int((k - 1).sum())
            nxt[jmp] = w + k
        live = nxt < w_total
        for dest in np.unique(nxt[live]):
            buckets[dest].append(act[nxt == dest])

    cat = lambda parts, dt: (
        np.concatenate(parts) if parts else np.empty(0, dtype=dt)
    )
    return TileResult(
        cat(out_i, np.int64), cat(out_j, np.int64), cat(out_w, np.int64),
        cat(out_c, np.float64), stats,
    )


def _binary_search_jump(
    c: np.ndarray,
    w: int,
    kmax: np.ndarray,
    flat: np.ndarray,
    width: int,
    pair_pos: np.ndarray,
    spec: SlidingSpec,
    stats: FrontierStats,
) -> np.ndarray:
    """Vectorized binary search for the smallest k ≥ 1 with UB(k) ≥ β.

    Returns k per pair, with k = kmax + 1 meaning "bounded below β to the
    end of the range" (the pair finishes). ``flat`` is the flattened
    per-pair monotone prefix G from ``bounds.slack_prefix`` (row stride
    ``width``), ``pair_pos`` the jumpers' pair positions:
    UB(k) ≥ β ⟺ G[a0 + m·k] ≥ G[a0] + (β − c)·n_s, so each probe is one
    scalar gather and one compare — no row copies.
    """
    n_s, m, beta = spec.n_s, spec.m, spec.beta
    a0 = spec.bw0 + w * m + n_s          # absolute index of first entering bw
    off = pair_pos * width + a0
    target = flat[off] + (beta - c) * n_s

    def reached(sel: np.ndarray, k: np.ndarray) -> np.ndarray:
        stats.probes += k.size
        return flat[off[sel] + m * k] >= target[sel]

    n = c.size
    every = np.arange(n)
    k_out = np.ones(n, dtype=np.int64)
    # Quick reject: UB(1) ≥ β means not even one window can be skipped.
    # In dense regions most below-β pairs land here, so the full search
    # runs only for pairs that actually get to jump.
    need = np.flatnonzero(~reached(every, np.ones(n, dtype=np.int64)))
    if need.size:
        hi0 = kmax[need]
        fin = ~reached(need, hi0)  # bound stays below β to the end: done
        k_sel = np.empty(need.size, dtype=np.int64)
        k_sel[fin] = hi0[fin] + 1
        srch = np.flatnonzero(~fin)
        if srch.size:
            # branchless bisection: fixed log₂ rounds over the whole
            # batch (no per-round subset filtering — numpy call overhead
            # beats the handful of redundant probes)
            sel = need[srch]
            off_s = off[sel]
            t_s = target[sel]
            lo = np.full(srch.size, 2, dtype=np.int64)
            hi = hi0[srch].copy()
            rounds = max(int(np.ceil(np.log2(max(int(hi.max()), 2)))), 1)
            for _ in range(rounds + 1):
                mid = (lo + hi) >> 1
                p = flat[off_s + m * mid] >= t_s
                stats.probes += mid.size
                hi = np.where(p, mid, hi)
                lo = np.where(p, lo, mid + 1)
            k_sel[srch] = lo
        k_out[need] = k_sel
    return k_out
