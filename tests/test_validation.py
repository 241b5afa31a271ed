"""SlidingSpec validation and derived window math."""
import pytest

from repro.tsio.validation import SlidingSpec


def spec(**kw):
    base = dict(start=0, end=240, window=48, step=12, beta=0.5, bw=12)
    base.update(kw)
    return SlidingSpec(**base)


class TestInvalidSpecs:
    @pytest.mark.parametrize("bw", [0, -1, -12])
    def test_nonpositive_bw(self, bw):
        with pytest.raises(ValueError, match="basic window"):
            spec(bw=bw)

    @pytest.mark.parametrize("window", [0, -48])
    def test_nonpositive_window(self, window):
        with pytest.raises(ValueError, match="window size"):
            spec(window=window)

    @pytest.mark.parametrize("step", [0, -12])
    def test_nonpositive_step(self, step):
        with pytest.raises(ValueError, match="step"):
            spec(step=step)

    def test_negative_start(self):
        with pytest.raises(ValueError, match="start"):
            spec(start=-12)

    @pytest.mark.parametrize("start,end", [(0, 0), (48, 48), (48, 12)])
    def test_empty_range(self, start, end):
        with pytest.raises(ValueError, match="empty"):
            spec(start=start, end=end, window=12)

    @pytest.mark.parametrize("beta", [-1.5, 1.01, 7.0])
    def test_beta_out_of_range(self, beta):
        with pytest.raises(ValueError, match="beta"):
            spec(beta=beta)

    @pytest.mark.parametrize("field,value", [
        ("start", 5), ("window", 50), ("step", 13),
    ])
    def test_misaligned_fields(self, field, value):
        with pytest.raises(ValueError, match="multiple of the basic window"):
            spec(**{field: value})

    def test_window_exceeds_range(self):
        with pytest.raises(ValueError, match="fit"):
            spec(window=480)

    def test_query_beyond_series(self):
        with pytest.raises(ValueError, match="exceeds series length"):
            spec().validate_against(120)

    def test_ragged_series_length(self):
        with pytest.raises(ValueError, match="not a multiple"):
            spec().validate_against(250)


class TestDerived:
    def test_n_s(self):
        assert spec().n_s == 4

    def test_m(self):
        assert spec().m == 1

    def test_m_multi(self):
        assert spec(step=24).m == 2

    def test_bw0(self):
        assert spec(start=24).bw0 == 2

    @pytest.mark.parametrize("start,end,window,step,expect", [
        (0, 240, 48, 12, 17),
        (0, 240, 48, 48, 5),
        (0, 240, 240, 12, 1),
        (24, 240, 48, 24, 8),
    ])
    def test_n_windows(self, start, end, window, step, expect):
        s = spec(start=start, end=end, window=window, step=step)
        assert s.n_windows == expect
        # last window must end inside the range, next one outside
        ws, we = s.window_t_range(s.n_windows - 1)
        assert we <= s.end
        assert s.window_t_range(s.n_windows)[1] > s.end

    def test_window_t_range(self):
        s = spec(start=24, step=24)
        assert s.window_t_range(0) == (24, 72)
        assert s.window_t_range(3) == (96, 144)

    def test_window_bw_start(self):
        s = spec(start=24, step=24)
        assert s.window_bw_start(0) == 2
        assert s.window_bw_start(3) == 8

    def test_n_bw(self):
        assert spec().n_bw(240) == 20

    def test_validate_against_ok(self):
        spec().validate_against(240)

    def test_frozen(self):
        with pytest.raises(Exception):
            spec().beta = 0.9
