"""Eq.-1 kernels against numpy ground truth across many configurations."""
import numpy as np
import pytest

from repro.sketch import kernels
from repro.synth_data import ar1_matrix, uscrn_like
from repro.tsio.validation import SlidingSpec


def build_all(X, spec):
    means, stds = kernels.bw_means_stds(X, spec.bw)
    xc = kernels.bw_centered(X, spec.bw)
    q = kernels.pair_bw_cov(xc, xc)
    mbar, ss = kernels.series_window_aggregates(means, stds, spec)
    return means, stds, q, mbar, ss


class TestBwStats:
    def test_means_match_numpy(self):
        X = ar1_matrix(n=4, length=120, seed=0)
        means, stds = kernels.bw_means_stds(X, 12)
        assert means.shape == (4, 10)
        for s in range(4):
            for b in range(10):
                seg = X[s, b * 12 : (b + 1) * 12]
                assert means[s, b] == pytest.approx(seg.mean())
                assert stds[s, b] == pytest.approx(seg.std())

    def test_ragged_length_rejected(self):
        with pytest.raises(ValueError, match="not a multiple"):
            kernels.bw_means_stds(np.zeros((2, 100)), 12)

    def test_centered_zero_mean(self):
        X = ar1_matrix(n=3, length=96, seed=1)
        xc = kernels.bw_centered(X, 8)
        assert np.abs(xc.mean(axis=2)).max() < 1e-12

    def test_pair_bw_cov_matches_numpy(self):
        X = ar1_matrix(n=5, length=60, seed=2)
        xc = kernels.bw_centered(X, 12)
        q = kernels.pair_bw_cov(xc, xc)
        for i in range(5):
            for j in range(5):
                for b in range(5):
                    a = X[i, b * 12 : (b + 1) * 12]
                    c = X[j, b * 12 : (b + 1) * 12]
                    expect = np.mean((a - a.mean()) * (c - c.mean()))
                    assert q[i, j, b] == pytest.approx(expect, abs=1e-12)


class TestSlidingSums:
    @pytest.mark.parametrize("step", [12, 24, 48])
    def test_matches_direct_sum(self, step):
        spec = SlidingSpec(start=0, end=240, window=48, step=step, beta=0.0, bw=12)
        arr = np.arange(3 * 20, dtype=float).reshape(3, 20)
        got = kernels.sliding_window_sums(arr, spec)
        assert got.shape == (3, spec.n_windows)
        for w in range(spec.n_windows):
            a = spec.window_bw_start(w)
            np.testing.assert_allclose(got[:, w], arr[:, a : a + spec.n_s].sum(axis=1))

    def test_offset_start(self):
        spec = SlidingSpec(start=48, end=240, window=48, step=24, beta=0.0, bw=12)
        arr = np.random.default_rng(0).random((2, 20))
        got = kernels.sliding_window_sums(arr, spec)
        for w in range(spec.n_windows):
            a = spec.window_bw_start(w)
            np.testing.assert_allclose(got[:, w], arr[:, a : a + spec.n_s].sum(axis=1))

    def test_3d_input(self):
        spec = SlidingSpec(start=0, end=120, window=24, step=12, beta=0.0, bw=12)
        arr = np.random.default_rng(1).random((4, 5, 10))
        got = kernels.sliding_window_sums(arr, spec)
        assert got.shape == (4, 5, spec.n_windows)
        np.testing.assert_allclose(got[2, 3], kernels.sliding_window_sums(arr[2, 3][None, :], spec)[0])


CONFIGS = [
    dict(start=0, end=240, window=48, step=12, bw=12),
    dict(start=0, end=240, window=48, step=48, bw=12),
    dict(start=24, end=240, window=72, step=24, bw=24),
    dict(start=0, end=240, window=240, step=12, bw=12),
    dict(start=0, end=240, window=24, step=12, bw=6),
    dict(start=60, end=240, window=60, step=30, bw=30),
]


class TestEq1Exactness:
    @pytest.mark.parametrize("cfg", CONFIGS)
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_eval_all_windows_equals_corrcoef(self, cfg, seed):
        X = ar1_matrix(n=6, length=240, seed=seed)
        spec = SlidingSpec(beta=0.0, **cfg)
        means, stds, q, mbar, ss = build_all(X, spec)
        corr = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        ref = kernels.exact_window_corr(X, spec)
        np.testing.assert_allclose(corr, ref, atol=1e-10)

    def test_on_climate_like_data(self):
        X = uscrn_like(n_stations=4, n_hours=480, seed=0)
        spec = SlidingSpec(start=0, end=480, window=96, step=24, beta=0.0, bw=24)
        means, stds, q, mbar, ss = build_all(X, spec)
        corr = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        ref = kernels.exact_window_corr(X, spec)
        np.testing.assert_allclose(corr, ref, atol=1e-9)

    def test_constant_series_gives_nan(self):
        X = ar1_matrix(n=3, length=120, seed=0)
        X[1] = 7.0  # constant: correlation undefined
        spec = SlidingSpec(start=0, end=120, window=24, step=12, beta=0.0, bw=12)
        means, stds, q, mbar, ss = build_all(X, spec)
        corr = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        assert np.isnan(corr[1, 0]).all() and np.isnan(corr[0, 1]).all()
        assert not np.isnan(corr[0, 2]).any()

    def test_perfectly_correlated_pair(self):
        rng = np.random.default_rng(3)
        base = rng.normal(size=120)
        X = np.stack([base, 2.0 * base + 5.0, -base])
        spec = SlidingSpec(start=0, end=120, window=24, step=12, beta=0.0, bw=12)
        means, stds, q, mbar, ss = build_all(X, spec)
        corr = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        np.testing.assert_allclose(corr[0, 1], 1.0, atol=1e-10)
        np.testing.assert_allclose(corr[0, 2], -1.0, atol=1e-10)

    def test_cross_block_evaluation(self):
        X = ar1_matrix(n=7, length=240, seed=5)
        spec = SlidingSpec(start=0, end=240, window=48, step=24, beta=0.0, bw=12)
        mi, si = kernels.bw_means_stds(X[:3], spec.bw)
        mj, sj = kernels.bw_means_stds(X[3:], spec.bw)
        q = kernels.pair_bw_cov(
            kernels.bw_centered(X[:3], spec.bw), kernels.bw_centered(X[3:], spec.bw)
        )
        mbi, ssi = kernels.series_window_aggregates(mi, si, spec)
        mbj, ssj = kernels.series_window_aggregates(mj, sj, spec)
        corr = kernels.eval_all_windows(q, mi, mj, mbi, mbj, ssi, ssj, spec)
        ref = kernels.exact_window_corr(X, spec)
        np.testing.assert_allclose(corr, ref[:3, 3:, :], atol=1e-10)


class TestEvalCells:
    @pytest.mark.parametrize("cfg", CONFIGS[:4])
    def test_matches_full_eval(self, cfg):
        X = ar1_matrix(n=5, length=240, seed=7)
        spec = SlidingSpec(beta=0.0, **cfg)
        means, stds, q, mbar, ss = build_all(X, spec)
        full = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        n = 5
        n_bw = q.shape[2]
        q2 = q.reshape(-1, n_bw)
        mm2 = np.einsum("ib,jb->ijb", means, means).reshape(-1, n_bw)
        pi = np.repeat(np.arange(n), n)
        pj = np.tile(np.arange(n), n)
        rng = np.random.default_rng(0)
        rows = rng.integers(0, n * n, 50)
        wins = rng.integers(0, spec.n_windows, 50)
        got = kernels.eval_cells(rows, wins, q2, mm2, mbar, mbar, ss, ss, pi, pj, spec)
        expect = full.reshape(n * n, -1)[rows, wins]
        np.testing.assert_allclose(got, expect, atol=1e-12)

    def test_empty_cells(self):
        X = ar1_matrix(n=3, length=120, seed=0)
        spec = SlidingSpec(start=0, end=120, window=24, step=12, beta=0.0, bw=12)
        means, stds, q, mbar, ss = build_all(X, spec)
        q2 = q.reshape(-1, q.shape[2])
        mm2 = np.einsum("ib,jb->ijb", means, means).reshape(-1, q.shape[2])
        pi = np.repeat(np.arange(3), 3)
        pj = np.tile(np.arange(3), 3)
        empty = np.empty(0, dtype=np.int64)
        got = kernels.eval_cells(empty, empty, q2, mm2, mbar, mbar, ss, ss, pi, pj, spec)
        assert got.shape == (0,)


class TestEvalAtWindow:
    """The shared sweep kernel both engines use, against the batch kernel."""

    @pytest.mark.parametrize("cfg", CONFIGS[:4])
    def test_matches_eval_all_windows(self, cfg):
        X = ar1_matrix(n=6, length=240, seed=8)
        spec = SlidingSpec(beta=0.0, **cfg)
        means, stds, q, mbar, ss = build_all(X, spec)
        full = kernels.eval_all_windows(q, means, means, mbar, mbar, ss, ss, spec)
        qmm2 = kernels.fuse_pair_terms(q, means, means)
        pi = np.repeat(np.arange(6), 6)
        pj = np.tile(np.arange(6), 6)
        rows = np.arange(36)
        for w in range(spec.n_windows):
            got = kernels.eval_at_window(
                rows, w, qmm2, mbar, mbar, ss, ss, pi, pj, spec
            )
            np.testing.assert_allclose(
                got.reshape(6, 6), full[:, :, w], atol=1e-12
            )

    def test_row_subset(self):
        X = ar1_matrix(n=5, length=120, seed=9)
        spec = SlidingSpec(start=0, end=120, window=24, step=12, beta=0.0, bw=12)
        means, stds, q, mbar, ss = build_all(X, spec)
        qmm2 = kernels.fuse_pair_terms(q, means, means)
        pi = np.repeat(np.arange(5), 5)
        pj = np.tile(np.arange(5), 5)
        sub = np.array([1, 7, 23])
        got = kernels.eval_at_window(sub, 3, qmm2, mbar, mbar, ss, ss, pi, pj, spec)
        ref = kernels.exact_window_corr(X, spec)
        for r, v in zip(sub, got):
            assert v == pytest.approx(ref[pi[r], pj[r], 3], abs=1e-10)


class TestFusePairTerms:
    def test_fused_equals_q_plus_mean_product(self):
        X = ar1_matrix(n=4, length=96, seed=10)
        means, stds = kernels.bw_means_stds(X, 12)
        q = kernels.pair_bw_cov(kernels.bw_centered(X, 12), kernels.bw_centered(X, 12))
        g = kernels.fuse_pair_terms(q, means, means)
        assert g.shape == (16, 8)
        expect = q + means[:, None, :] * means[None, :, :]
        np.testing.assert_allclose(g, expect.reshape(16, 8), atol=1e-12)


class TestExactWindowCorr:
    def test_matches_corrcoef_per_window(self):
        X = ar1_matrix(n=4, length=96, seed=9)
        spec = SlidingSpec(start=0, end=96, window=48, step=24, beta=0.0, bw=24)
        ref = kernels.exact_window_corr(X, spec)
        for w in range(spec.n_windows):
            ws, we = spec.window_t_range(w)
            np.testing.assert_allclose(ref[:, :, w], np.corrcoef(X[:, ws:we]), atol=1e-12)
