"""Real-valued orthonormal DFT: roundtrip, isometry, energy profiles."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.tomborg.spectra import energy_profile, real_dft, real_idft

LENGTHS = [2, 3, 4, 8, 9, 16, 17, 64, 101, 128]


class TestRoundTrip:
    @pytest.mark.parametrize("length", LENGTHS)
    def test_idft_inverts_dft(self, length):
        x = np.random.default_rng(length).normal(size=(4, length))
        np.testing.assert_allclose(real_idft(real_dft(x)), x, atol=1e-10)

    @pytest.mark.parametrize("length", LENGTHS)
    def test_dft_inverts_idft(self, length):
        c = np.random.default_rng(length + 1).normal(size=(4, length))
        np.testing.assert_allclose(real_dft(real_idft(c)), c, atol=1e-10)

    def test_1d_input(self):
        x = np.random.default_rng(0).normal(size=32)
        np.testing.assert_allclose(real_idft(real_dft(x)), x, atol=1e-10)


class TestIsometry:
    @pytest.mark.parametrize("length", LENGTHS)
    def test_parseval(self, length):
        x = np.random.default_rng(length).normal(size=(3, length))
        c = real_dft(x)
        np.testing.assert_allclose((c * c).sum(axis=1), (x * x).sum(axis=1), rtol=1e-12)

    @pytest.mark.parametrize("length", [8, 17, 64])
    def test_inner_products_preserved(self, length):
        g = np.random.default_rng(length).normal(size=(5, length))
        c = real_dft(g)
        np.testing.assert_allclose(c @ c.T, g @ g.T, atol=1e-9)

    @given(st.integers(2, 200), st.integers(0, 1000))
    @settings(max_examples=40, deadline=None)
    def test_distance_preserved_property(self, length, seed):
        g = np.random.default_rng(seed).normal(size=(2, length))
        cx, cy = real_dft(g)
        d_time = np.linalg.norm(g[0] - g[1])
        d_freq = np.linalg.norm(cx - cy)
        assert d_freq == pytest.approx(d_time, rel=1e-9)

    def test_linear(self):
        x = np.random.default_rng(1).normal(size=24)
        y = np.random.default_rng(2).normal(size=24)
        np.testing.assert_allclose(
            real_dft(2.0 * x - 3.0 * y), 2.0 * real_dft(x) - 3.0 * real_dft(y), atol=1e-10
        )

    def test_constant_maps_to_dc_only(self):
        c = real_dft(np.full(16, 5.0))
        assert abs(c[0]) > 0
        np.testing.assert_allclose(c[1:], 0.0, atol=1e-10)


class TestEnergyProfile:
    @pytest.mark.parametrize("length", [16, 17, 64])
    @pytest.mark.parametrize("alpha", [0.0, 1.0, 2.0])
    def test_unit_energy(self, length, alpha):
        s = energy_profile(length, alpha)
        assert (s * s).sum() == pytest.approx(1.0)

    def test_dc_suppressed(self):
        assert energy_profile(32, 1.0)[0] == 0.0

    def test_flat_profile_is_flat(self):
        s = energy_profile(33, 0.0)
        np.testing.assert_allclose(s[1:], s[1], rtol=1e-12)

    def test_concentration_orders_profiles(self):
        flat = energy_profile(64, 0.0)
        conc = energy_profile(64, 2.0)
        # concentrated profile puts more of its (unit) energy in low freqs
        assert (conc[:8] ** 2).sum() > (flat[:8] ** 2).sum()

    def test_generated_series_zero_mean(self):
        s = energy_profile(48, 1.0)
        x = real_idft(np.random.default_rng(0).normal(size=(6, 48)) * s)
        np.testing.assert_allclose(x.mean(axis=1), 0.0, atol=1e-12)
