"""Catalyst Eq.-1 engine vs numpy and the DuckDB oracle."""
import numpy as np
import pytest

from repro.oracle import assert_equivalent
from repro.sketch import kernels
from repro.sketch.basic_window import build_series_sketch
from repro.sketch.combine import query_window_corr, threshold
from repro.sketch.pair_sketch import build_pair_sketch_rows
from repro.synth_data import ar1_matrix
from repro.tsio.matrix import to_long_df, to_long_pdf, window_slices
from repro.tsio.validation import SlidingSpec

N, L = 6, 120
SPEC = SlidingSpec(start=0, end=L, window=24, step=12, beta=0.4, bw=12)

ORACLE_SQL = """
SELECT a.series_id AS i, b.series_id AS j, w.w AS w,
       corr(a.value, b.value) AS corr
FROM ts a
JOIN ts b ON a.t = b.t AND a.series_id < b.series_id
JOIN wins w ON a.t >= w.ws AND a.t < w.we
GROUP BY 1, 2, 3
"""


@pytest.fixture(scope="module")
def X():
    return ar1_matrix(n=N, length=L, seed=13)


@pytest.fixture(scope="module")
def cells_df(spark, X):
    long_df = to_long_df(spark, X)
    long_df.cache().count()
    series = build_series_sketch(long_df, SPEC.bw)
    pairs = build_pair_sketch_rows(long_df, SPEC)
    df = query_window_corr(series, pairs, SPEC).cache()
    df.count()
    return df


class TestCatalystEq1:
    def test_matches_numpy_reference(self, cells_df, X):
        ref = kernels.exact_window_corr(X, SPEC)
        pdf = cells_df.toPandas()
        assert len(pdf) == (N * (N - 1) // 2) * SPEC.n_windows
        for row in pdf.itertuples():
            assert row.corr == pytest.approx(ref[row.i, row.j, row.w], abs=1e-9)

    def test_against_duckdb_oracle(self, cells_df, X):
        assert_equivalent(
            cells_df,
            ORACLE_SQL,
            ts=to_long_pdf(X),
            wins=window_slices(SPEC),
        )

    def test_threshold_keeps_only_edges(self, cells_df):
        got = threshold(cells_df, 0.4).toPandas()
        assert (got["corr"] >= 0.4).all()
        full = cells_df.toPandas()
        assert len(got) == (full["corr"] >= 0.4).sum()


class TestOffsetQuery:
    def test_subrange_query_matches_oracle(self, spark, X):
        spec = SlidingSpec(start=24, end=120, window=48, step=24, beta=0.0, bw=12)
        long_df = to_long_df(spark, X)
        series = build_series_sketch(long_df, spec.bw)
        pairs = build_pair_sketch_rows(long_df, spec)
        df = query_window_corr(series, pairs, spec)
        assert_equivalent(
            df,
            ORACLE_SQL,
            ts=to_long_pdf(X),
            wins=window_slices(spec),
        )
