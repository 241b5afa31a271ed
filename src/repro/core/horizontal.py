"""Horizontal computation pruning via the triangle bound, as DataFrame filters.

Dangoron's second feature: with a pivot series z, the N per-window pivot
correlations c(x, z) bound every remaining pair —
c_xy ≤ c_xz·c_yz + √((1−c_xz²)(1−c_yz²)) (sound: the 3×3 correlation
matrix is PSD). The dataflow is exactly the "prune unrelated series via
DataFrame filters" shape:

  1. Arrow kernel: pivot column of the correlation matrix, N·W cells;
  2. Catalyst: self-join the pivot frame on the window id, compute the
     upper bound as a column expression, ``filter(ub >= β)``;
  3. cogrouped Arrow kernel: exact Eq.-1 evaluation of the surviving
     (pair, window) cells only.

Because the bound is sound, the output is identical to the unpruned
exact engines — only the amount of exact evaluation changes.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.dangoron import CELLS_SCHEMA
from repro.sketch import kernels
from repro.sketch.pair_sketch import load_pair_payload
from repro.tsio.validation import SlidingSpec

PIVOT_SCHEMA = "x long, w long, c double"


def pivot_correlations(
    pair_sketch_df: DataFrame, spec: SlidingSpec, pivot: int
) -> DataFrame:
    """Exact per-window correlations of every series against the pivot.

    One row (x, w, c) per series x ≠ pivot and window w; undefined cells
    (zero variance) carry NaN and are treated as unprunable downstream.
    """

    def run(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            for row in pdf.itertuples(index=False):
                tile = load_pair_payload(row.payload)
                for side, other in (("i", "j"), ("j", "i")):
                    ids_p = tile[f"ids_{side}"]
                    if pivot not in ids_p:
                        continue
                    lp = int(np.searchsorted(ids_p, pivot))
                    ids_o = tile[f"ids_{other}"]
                    mb_p, ss_p = kernels.series_window_aggregates(
                        tile[f"means_{side}"], tile[f"stds_{side}"], spec
                    )
                    mb_o, ss_o = kernels.series_window_aggregates(
                        tile[f"means_{other}"], tile[f"stds_{other}"], spec
                    )
                    q = tile["q"] if side == "i" else np.swapaxes(tile["q"], 0, 1)
                    corr = kernels.eval_all_windows(
                        q[lp : lp + 1],
                        tile[f"means_{side}"][lp : lp + 1],
                        tile[f"means_{other}"],
                        mb_p[lp : lp + 1],
                        mb_o,
                        ss_p[lp : lp + 1],
                        ss_o,
                        spec,
                    )[0]                      # (n_other, W)
                    keep = ids_o != pivot
                    nw = spec.n_windows
                    yield pd.DataFrame(
                        {
                            "x": np.repeat(ids_o[keep], nw),
                            "w": np.tile(np.arange(nw, dtype=np.int64), int(keep.sum())),
                            "c": corr[keep].reshape(-1),
                        }
                    )
                    if tile["diag"]:
                        break  # both sides are the same block; emit once

    return pair_sketch_df.mapInPandas(run, schema=PIVOT_SCHEMA)


def candidate_cells(pivot_df: DataFrame, beta: float) -> DataFrame:
    """Catalyst filter stage: (i, j, w) cells whose triangle UB ≥ β."""
    a = pivot_df.select(
        F.col("x").alias("i"), F.col("w"), F.col("c").alias("ca")
    )
    b = pivot_df.select(
        F.col("x").alias("j"), F.col("w").alias("w_b"), F.col("c").alias("cb")
    )
    joined = a.join(b, (a.w == b.w_b) & (a.i < b.j)).drop("w_b")
    ub = F.when(
        F.isnan("ca") | F.isnan("cb"), F.lit(1.0)
    ).otherwise(
        F.col("ca") * F.col("cb")
        + F.sqrt(
            F.greatest(
                (1.0 - F.col("ca") * F.col("ca"))
                * (1.0 - F.col("cb") * F.col("cb")),
                F.lit(0.0),
            )
        )
    )
    return joined.withColumn("ub", ub).where(F.col("ub") >= F.lit(beta)).select(
        "i", "j", "w"
    )


def _eval_candidates(
    cand: pd.DataFrame, tile: dict, spec: SlidingSpec
) -> pd.DataFrame:
    """Exact Eq.-1 evaluation of listed (i, j, w) cells of one tile."""
    ids_i, ids_j = tile["ids_i"], tile["ids_j"]
    li = np.searchsorted(ids_i, cand["i"].to_numpy())
    lj = np.searchsorted(ids_j, cand["j"].to_numpy())
    wins = cand["w"].to_numpy().astype(np.int64)
    nj = len(ids_j)
    n_bw = tile["q"].shape[2]
    mb_i, ss_i = kernels.series_window_aggregates(tile["means_i"], tile["stds_i"], spec)
    mb_j, ss_j = kernels.series_window_aggregates(tile["means_j"], tile["stds_j"], spec)
    q2 = tile["q"].reshape(-1, n_bw)
    mm2 = np.einsum(
        "ib,jb->ijb", tile["means_i"], tile["means_j"], optimize=True
    ).reshape(-1, n_bw)
    rows = li * nj + lj
    ni_arr = np.arange(len(ids_i))
    # eval_cells expects per-flat-pair local indices; build them directly.
    pi_flat = np.repeat(ni_arr, nj)
    pj_flat = np.tile(np.arange(nj), len(ids_i))
    corr = kernels.eval_cells(
        rows, wins, q2, mm2, mb_i, mb_j, ss_i, ss_j, pi_flat, pj_flat, spec
    )
    keep = corr >= spec.beta
    return pd.DataFrame(
        {
            "i": cand["i"].to_numpy()[keep],
            "j": cand["j"].to_numpy()[keep],
            "w": wins[keep],
            "corr": corr[keep],
        }
    )


def query(
    spark: SparkSession,
    pair_sketch_df: DataFrame,
    spec: SlidingSpec,
    pivot: int,
    block_size: int,
) -> DataFrame:
    """Full horizontally-pruned query: pivot stage → filter → exact eval.

    Output is the same thresholded edge set as the exact engines. The
    pivot's own edges come straight from stage 1; all other pairs pass
    through the triangle filter before exact evaluation.
    """
    pivot_df = pivot_correlations(pair_sketch_df, spec, pivot).cache()

    pivot_edges = (
        pivot_df.where(F.col("c") >= F.lit(spec.beta))
        .select(
            F.least(F.col("x"), F.lit(pivot)).alias("i"),
            F.greatest(F.col("x"), F.lit(pivot)).alias("j"),
            F.col("w"),
            F.col("c").alias("corr"),
        )
    )

    cand = candidate_cells(pivot_df, spec.beta).withColumn(
        "bi", (F.col("i") / F.lit(block_size)).cast("long")
    ).withColumn("bj", (F.col("j") / F.lit(block_size)).cast("long"))

    sketch = pair_sketch_df.select("bi", "bj", "payload")

    def cog(cand_pdf: pd.DataFrame, sk_pdf: pd.DataFrame) -> pd.DataFrame:
        if len(cand_pdf) == 0 or len(sk_pdf) == 0:
            return pd.DataFrame(
                {"i": [], "j": [], "w": [], "corr": []}
            ).astype({"i": "int64", "j": "int64", "w": "int64", "corr": "float64"})
        tile = load_pair_payload(sk_pdf["payload"].iloc[0])
        return _eval_candidates(cand_pdf, tile, spec)

    evaluated = (
        cand.groupBy("bi", "bj")
        .cogroup(sketch.groupBy("bi", "bj"))
        .applyInPandas(cog, schema=CELLS_SCHEMA)
    )
    return evaluated.unionByName(pivot_edges)


def survival_fraction(
    spark: SparkSession, pair_sketch_df: DataFrame, spec: SlidingSpec,
    pivot: int, n_series: int,
) -> dict:
    """Measure the filter's pruning power (Table 4): survivors / total cells."""
    pivot_df = pivot_correlations(pair_sketch_df, spec, pivot).cache()
    survivors = candidate_cells(pivot_df, spec.beta).count()
    non_pivot_pairs = (n_series - 1) * (n_series - 2) // 2
    total = non_pivot_pairs * spec.n_windows
    pivot_df.unpersist()
    return {
        "survivors": survivors,
        "total": total,
        "survive_fraction": survivors / total if total else 0.0,
        "pivot_cells": (n_series - 1) * spec.n_windows,
    }
