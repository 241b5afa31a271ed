"""Tomborg: target sampling, PSD projection, panel generation."""
import numpy as np
import pytest

from repro.sketch import kernels
from repro.tomborg.distributions import DISTRIBUTIONS, nearest_correlation, sample_target
from repro.tomborg.generator import generate, generate_drifting, generate_named, sqrt_psd
from repro.tsio.validation import SlidingSpec


class TestNearestCorrelation:
    def test_output_is_valid_correlation_matrix(self):
        rng = np.random.default_rng(0)
        raw = rng.uniform(-1, 1, size=(12, 12))
        c = nearest_correlation(raw)
        np.testing.assert_allclose(np.diag(c), 1.0, atol=1e-12)
        np.testing.assert_allclose(c, c.T, atol=1e-12)
        assert np.linalg.eigvalsh(c).min() >= -1e-8
        assert np.abs(c).max() <= 1.0 + 1e-9

    def test_already_valid_matrix_unchanged(self):
        c0 = np.array([[1.0, 0.5], [0.5, 1.0]])
        np.testing.assert_allclose(nearest_correlation(c0), c0, atol=1e-6)


class TestSampleTarget:
    @pytest.mark.parametrize("name", DISTRIBUTIONS)
    def test_valid_correlation_matrix(self, name):
        c = sample_target(name, 16, seed=1)
        assert c.shape == (16, 16)
        np.testing.assert_allclose(np.diag(c), 1.0, atol=1e-9)
        assert np.linalg.eigvalsh(c).min() >= -1e-8

    def test_deterministic_in_seed(self):
        a = sample_target("uniform", 10, seed=5)
        b = sample_target("uniform", 10, seed=5)
        np.testing.assert_array_equal(a, b)

    def test_regimes_are_ordered(self):
        lo = sample_target("sparse-low", 24, seed=2)
        hi = sample_target("dense-high", 24, seed=2)
        off = ~np.eye(24, dtype=bool)
        assert lo[off].mean() < hi[off].mean()

    def test_block_structure(self):
        c = sample_target("block", 16, seed=3, block_size=8)
        inside = c[:8, :8][~np.eye(8, dtype=bool)].mean()
        across = c[:8, 8:].mean()
        assert inside > across + 0.2

    def test_unknown_name(self):
        with pytest.raises(ValueError, match="unknown target"):
            sample_target("nope", 8)


class TestGenerate:
    def test_flat_spectrum_hits_target(self):
        c = sample_target("block", 20, seed=1)
        x = generate(c, 4096, alpha=0.0, seed=2)
        emp = np.corrcoef(x)
        assert np.abs(emp - c).max() < 0.08

    def test_concentrated_spectrum_drifts_more(self):
        c = sample_target("block", 16, seed=1)
        flat = np.abs(np.corrcoef(generate(c, 2048, alpha=0.0, seed=3)) - c).mean()
        conc = np.abs(np.corrcoef(generate(c, 2048, alpha=2.0, seed=3)) - c).mean()
        assert conc > flat

    def test_zero_mean_series(self):
        x = generate(sample_target("uniform", 6, seed=0), 256, seed=1)
        np.testing.assert_allclose(x.mean(axis=1), 0.0, atol=1e-10)

    def test_generate_named_returns_target(self):
        x, c = generate_named("sparse-low", 8, 512, seed=4)
        assert x.shape == (8, 512)
        assert c.shape == (8, 8)

    def test_sqrt_psd(self):
        c = sample_target("uniform", 10, seed=6)
        r = sqrt_psd(c)
        np.testing.assert_allclose(r @ r.T, c, atol=1e-6)


class TestDrifting:
    def test_correlation_moves_between_targets(self):
        ca = sample_target("sparse-low", 12, seed=7)
        cb = sample_target("dense-high", 12, seed=8)
        x = generate_drifting(ca, cb, 2400, alpha=0.0, seed=9)
        spec = SlidingSpec(start=0, end=2400, window=480, step=480, beta=0.0, bw=48)
        ref = kernels.exact_window_corr(x, spec)
        off = ~np.eye(12, dtype=bool)
        first = ref[:, :, 0][off].mean()
        last = ref[:, :, spec.n_windows - 1][off].mean()
        assert last > first + 0.1  # drifted toward the dense-high regime
