"""Generators: determinism, shapes, and the climate-like structure."""
import numpy as np
import pytest

from repro.synth_data import ar1_matrix, uscrn_like
from repro.tsio.matrix import from_long_pdf, to_long_pdf, window_slices
from repro.tsio.validation import SlidingSpec


class TestAr1Matrix:
    def test_shape_and_determinism(self):
        a = ar1_matrix(n=5, length=100, seed=7)
        b = ar1_matrix(n=5, length=100, seed=7)
        assert a.shape == (5, 100)
        np.testing.assert_array_equal(a, b)

    def test_autocorrelated(self):
        x = ar1_matrix(n=1, length=5000, phi=0.95, seed=0)[0]
        lag1 = np.corrcoef(x[:-1], x[1:])[0, 1]
        assert lag1 > 0.85


class TestUscrnLike:
    @pytest.fixture(scope="class")
    def panel(self):
        return uscrn_like(n_stations=8, n_hours=2160, seed=1)

    def test_shape(self, panel):
        assert panel.shape == (32, 2160)  # 8 stations × 4 variables

    def test_deterministic(self):
        a = uscrn_like(n_stations=4, n_hours=240, seed=3)
        b = uscrn_like(n_stations=4, n_hours=240, seed=3)
        np.testing.assert_array_equal(a, b)

    def test_same_variable_more_correlated_than_cross(self, panel):
        n = 8
        temp = panel[:n]
        precip = panel[3 * n : 4 * n]
        within = np.corrcoef(temp)[~np.eye(n, dtype=bool)].mean()
        cross = np.corrcoef(temp, precip)[:n, n:].mean()
        assert within > cross + 0.3

    def test_temperature_has_diurnal_cycle(self, panel):
        x = panel[0]
        # correlation with a 24h-shifted copy is high for temperature
        assert np.corrcoef(x[:-24], x[24:])[0, 1] > 0.7

    def test_mixed_pair_population(self, panel):
        # a threshold separates the pair population: some high, many low
        c = np.corrcoef(panel)
        off = c[~np.eye(len(c), dtype=bool)]
        assert (off > 0.7).mean() > 0.01
        assert (off < 0.3).mean() > 0.3

    def test_unknown_variable_rejected(self):
        with pytest.raises(ValueError, match="unknown USCRN-like variable"):
            uscrn_like(n_stations=2, n_hours=48, variables=("magma",))


class TestLongForm:
    def test_roundtrip(self):
        X = ar1_matrix(n=3, length=40, seed=0)
        np.testing.assert_allclose(from_long_pdf(to_long_pdf(X)), X)

    def test_holes_rejected(self):
        pdf = to_long_pdf(ar1_matrix(n=2, length=10, seed=0)).iloc[:-1]
        with pytest.raises(ValueError, match="full"):
            from_long_pdf(pdf)

    def test_window_slices(self):
        spec = SlidingSpec(start=24, end=240, window=48, step=24, beta=0.0, bw=24)
        ws = window_slices(spec)
        assert len(ws) == spec.n_windows
        assert ws.iloc[0].tolist() == [0, 24, 72]
        assert (ws["we"] - ws["ws"] == 48).all()
