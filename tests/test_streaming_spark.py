"""Streaming sketch maintenance: batch-equivalence and serving queries."""
import os

import numpy as np
import pandas as pd
import pytest

from repro.baselines import tsubasa
from repro.harness import build_sketch
from repro.sketch import kernels
from repro.sketch.basic_window import build_series_sketch
from repro.streaming.query import query_dangoron, store_to_tile
from repro.streaming.sketch_stream import (
    SketchStore,
    run_stream,
    windowed_series_sketch,
)
from repro.synth_data import ar1_matrix
from repro.tsio.matrix import to_long_df, to_long_pdf
from repro.tsio.validation import SlidingSpec

N, L = 8, 480
SPEC = SlidingSpec(start=0, end=L, window=96, step=24, beta=0.4, bw=24)


@pytest.fixture(scope="module")
def X():
    return ar1_matrix(n=N, length=L, seed=41)


def stage_files(X, directory, n_files):
    """Write the long form as n_files parquet files split along time."""
    os.makedirs(directory, exist_ok=True)
    pdf = to_long_pdf(X)
    bounds = np.linspace(0, X.shape[1], n_files + 1, dtype=int)
    for k, (lo, hi) in enumerate(zip(bounds, bounds[1:])):
        part = pdf[(pdf["t"] >= lo) & (pdf["t"] < hi)]
        part.to_parquet(os.path.join(directory, f"part-{k:03d}.parquet"))


class TestForeachBatchStore:
    @pytest.fixture(scope="class")
    def store(self, spark, X, tmp_path_factory):
        root = tmp_path_factory.mktemp("stream")
        stage_files(X, str(root / "in"), n_files=6)
        store = SketchStore(str(root / "store"), bw=SPEC.bw)
        run_stream(spark, str(root / "in"), store)
        return store

    def test_processed_in_multiple_batches(self, store):
        assert store.batches_applied >= 2  # maxFilesPerTrigger=1 over 6 files

    def test_series_store_equals_batch_builder(self, spark, store, X):
        batch = (
            build_series_sketch(to_long_df(spark, X), SPEC.bw)
            .toPandas()
            .sort_values(["series_id", "bw_id"])
            .reset_index(drop=True)
        )
        got = store.series_sketch()[batch.columns]
        pd.testing.assert_frame_equal(
            got.astype(batch.dtypes.to_dict()), batch, check_exact=False, atol=1e-9
        )

    def test_pair_store_matches_numpy(self, store, X):
        xc = kernels.bw_centered(X, SPEC.bw)
        q = kernels.pair_bw_cov(xc, xc)
        pdf = store.pair_sketch()
        assert len(pdf) == (N * (N - 1) // 2) * (L // SPEC.bw)
        for r in pdf.itertuples():
            assert r.q == pytest.approx(q[r.i, r.j, r.bw_id], abs=1e-9)

    def test_dangoron_on_store_matches_batch_engine(self, spark, store, X):
        streamed = query_dangoron(store, SPEC, "worst-case")
        h = build_sketch(spark, X, SPEC, block_size=4)
        batch = tsubasa.query(h.df, SPEC).toPandas()
        h.unpersist()
        key = ["i", "j", "w"]
        s = streamed.sort_values(key).reset_index(drop=True)
        b = batch.sort_values(key).reset_index(drop=True)
        # worst-case Dangoron may skip (miss) some cells; it must never
        # invent cells, and shared cells must agree exactly
        sk = set(map(tuple, s[key].to_numpy()))
        bk = set(map(tuple, b[key].to_numpy()))
        assert sk <= bk
        assert len(sk) >= 0.8 * len(bk)
        merged = s.merge(b, on=key, suffixes=("_s", "_b"))
        np.testing.assert_allclose(merged["corr_s"], merged["corr_b"], atol=1e-9)

    def test_incremental_append_extends_store(self, spark, store, X, tmp_path_factory):
        # stream 2 more days for the same series; store grows, old bws intact
        extra_root = tmp_path_factory.mktemp("stream-extra")
        rng = np.random.default_rng(99)
        X2 = rng.normal(size=(N, 48))
        pdf = to_long_pdf(X2)
        pdf["t"] += L
        os.makedirs(extra_root / "in", exist_ok=True)
        pdf.to_parquet(str(extra_root / "in" / "part-000.parquet"))
        before = len(store.series_sketch())
        run_stream(spark, str(extra_root / "in"), store)
        after = store.series_sketch()
        assert len(after) == before + N * 2
        assert after["bw_id"].max() == L // SPEC.bw + 1

    def test_partial_cross_section_rejected(self, store):
        bad = pd.DataFrame({"series_id": [0], "t": [10_000], "value": [1.0]})
        if N > 1:
            with pytest.raises(ValueError, match="complete timesteps"):
                store.apply_batch(bad)


class TestWindowedAggregation:
    def test_event_time_window_agg_equals_batch(self, spark, X, tmp_path_factory):
        root = tmp_path_factory.mktemp("stream-win")
        stage_files(X, str(root / "in"), n_files=4)
        got = (
            windowed_series_sketch(spark, str(root / "in"), SPEC.bw, "win_sketch_t")
            .toPandas()
            .sort_values(["series_id", "bw_id"])
            .reset_index(drop=True)
        )
        batch = (
            build_series_sketch(to_long_df(spark, X), SPEC.bw)
            .toPandas()
            .sort_values(["series_id", "bw_id"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(
            got[batch.columns].astype(batch.dtypes.to_dict()),
            batch,
            check_exact=False,
            atol=1e-9,
        )


class TestStoreAssembly:
    def test_store_to_tile_roundtrip(self, spark, X, tmp_path_factory):
        root = tmp_path_factory.mktemp("tile")
        store = SketchStore(str(root), bw=SPEC.bw)
        store.apply_batch(to_long_pdf(X))
        tile = store_to_tile(store)
        means, stds = kernels.bw_means_stds(X, SPEC.bw)
        np.testing.assert_allclose(tile["means_i"], means, atol=1e-9)
        np.testing.assert_allclose(tile["stds_i"], stds, atol=1e-9)

    def test_save_load(self, X, tmp_path_factory):
        root = tmp_path_factory.mktemp("persist")
        store = SketchStore(str(root), bw=SPEC.bw)
        store.apply_batch(to_long_pdf(X))
        store.save()
        loaded = SketchStore(str(root), bw=SPEC.bw).load()
        pd.testing.assert_frame_equal(store.series_sketch(), loaded.series_sketch())
        pd.testing.assert_frame_equal(store.pair_sketch(), loaded.pair_sketch())

    def test_ragged_store_rejected(self, X, tmp_path_factory):
        root = tmp_path_factory.mktemp("ragged")
        store = SketchStore(str(root), bw=SPEC.bw, track_pairs=False)
        pdf = to_long_pdf(X[:2, :48])
        # series 0 has two basic windows, series 1 only one: ragged grid
        store.apply_batch(pdf[(pdf["series_id"] == 0) | (pdf["t"] < 24)])
        with pytest.raises(ValueError, match="ragged|contiguous"):
            store_to_tile(store)
