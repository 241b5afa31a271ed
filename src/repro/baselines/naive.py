"""Naive baseline: per-window recomputation from raw values.

No sketches, no reuse: for every sliding window the full N×l slice is
re-centred and the all-pairs correlation matrix recomputed (Θ(N²·l) per
window). Work is distributed over windows: the dense matrix is
broadcast once, a DataFrame of window ids fans the windows out, and an
Arrow kernel computes each window's matrix.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.dangoron import CELLS_SCHEMA
from repro.tsio.validation import SlidingSpec


def query(spark: SparkSession, X: np.ndarray, spec: SlidingSpec) -> DataFrame:
    """Thresholded correlation-matrix sequence by brute force."""
    spec.validate_against(X.shape[1])
    bc = spark.sparkContext.broadcast(X)
    beta = spec.beta
    wins = spark.range(spec.n_windows).toDF("w")

    def run(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        xm = bc.value
        iu, ju = np.triu_indices(xm.shape[0], k=1)
        for pdf in it:
            for w in pdf["w"].to_numpy():
                ws, we = spec.window_t_range(int(w))
                seg = xm[:, ws:we]
                segc = seg - seg.mean(axis=1, keepdims=True)
                norms = np.sqrt((segc * segc).sum(axis=1))
                cov = segc @ segc.T
                den = np.outer(norms, norms)
                with np.errstate(invalid="ignore", divide="ignore"):
                    corr = np.where(den > 0, cov / den, np.nan)
                vals = corr[iu, ju]
                keep = vals >= beta
                yield pd.DataFrame(
                    {
                        "i": iu[keep].astype(np.int64),
                        "j": ju[keep].astype(np.int64),
                        "w": np.full(int(keep.sum()), w, dtype=np.int64),
                        "corr": vals[keep],
                    }
                )

    return wins.repartition(min(spec.n_windows, 64)).mapInPandas(
        run, schema=CELLS_SCHEMA
    )
