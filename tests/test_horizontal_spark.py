"""The horizontal pruning dataflow stage by stage."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import bounds, horizontal
from repro.sketch import kernels
from repro.synth_data import uscrn_like
from repro.harness import build_sketch
from repro.tsio.validation import SlidingSpec

N = 12
L = 480
SPEC = SlidingSpec(start=0, end=L, window=96, step=48, beta=0.5, bw=24)


@pytest.fixture(scope="module")
def X():
    return uscrn_like(n_stations=3, n_hours=L, seed=33)


@pytest.fixture(scope="module")
def sketch(spark, X):
    h = build_sketch(spark, X, SPEC, block_size=5)
    yield h
    h.unpersist()


class TestCandidateStage:
    def test_filter_matches_numpy_triangle_bound(self, spark, sketch, X):
        pivot = 2
        pivot_pdf = horizontal.pivot_correlations(sketch.df, SPEC, pivot).toPandas()
        cand = horizontal.candidate_cells(
            horizontal.pivot_correlations(sketch.df, SPEC, pivot), SPEC.beta
        ).toPandas()
        got = set(map(tuple, cand[["i", "j", "w"]].to_numpy()))
        # numpy reference of the same filter
        ref = kernels.exact_window_corr(X, SPEC)
        expect = set()
        for i in range(N):
            for j in range(i + 1, N):
                if pivot in (i, j):
                    continue
                for w in range(SPEC.n_windows):
                    ca, cb = ref[i, pivot, w], ref[j, pivot, w]
                    if np.isnan(ca) or np.isnan(cb):
                        expect.add((i, j, w))
                        continue
                    _, hi = bounds.triangle_bounds(np.array([ca]), np.array([cb]))
                    if hi[0] >= SPEC.beta:
                        expect.add((i, j, w))
        assert got == expect

    def test_candidates_are_catalyst_filter(self, sketch):
        # the pruning stage must be a Catalyst Filter over the joined
        # pivot frame — the "DataFrame filter" dataflow, not a UDF scan
        plan = horizontal.candidate_cells(
            horizontal.pivot_correlations(sketch.df, SPEC, 0), SPEC.beta
        )._jdf.queryExecution().optimizedPlan().toString()
        assert "Filter" in plan

    def test_soundness_no_true_edge_pruned(self, spark, sketch, X):
        pivot = 0
        cand = horizontal.candidate_cells(
            horizontal.pivot_correlations(sketch.df, SPEC, pivot), SPEC.beta
        ).toPandas()
        got = set(map(tuple, cand[["i", "j", "w"]].to_numpy()))
        ref = kernels.exact_window_corr(X, SPEC)
        for i in range(N):
            for j in range(i + 1, N):
                if pivot in (i, j):
                    continue
                for w in range(SPEC.n_windows):
                    if ref[i, j, w] >= SPEC.beta:
                        assert (i, j, w) in got, "sound bound pruned a true edge"
