"""Pairwise basic-window covariance sketches.

Two builders:

- ``build_pair_block_sketch`` — the production path. Cross-joins the
  block-bundle DataFrame with itself (Catalyst fans out the block-pair
  tiles) and computes each tile's pairwise bw-covariance tensor with an
  einsum kernel. The result — one binary payload per block pair — is
  what both query engines (TSUBASA baseline and Dangoron) consume;
  building it is the shared "sketch build" phase that pure query time
  excludes.

- ``build_pair_sketch_rows`` — a pure-Catalyst row-level equivalent
  (one row per (i, j, bw)), used by the DataFrame-native Eq.-1 engine in
  ``combine`` and by correctness tests. It self-joins the long form, so
  it is only meant for modest N.
"""
from __future__ import annotations

import pickle
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.sketch import kernels
from repro.sketch.blocks import load_bundle
from repro.tsio.validation import SlidingSpec

PAIR_BLOCK_SCHEMA = "bi long, bj long, payload binary"
PAIR_ROWS_SCHEMA = "i long, j long, bw_id long, q double"


def build_pair_block_sketch(blocks_df: DataFrame) -> DataFrame:
    """Block bundles -> one sketch payload per block pair (bi <= bj).

    The payload holds everything Eq.-1 evaluation needs for the tile:
    global series ids, per-bw means/stds of both blocks, and the
    pairwise bw covariance tensor q (ni, nj, n_bw). The centred raw
    data is *not* carried forward — after this stage every engine works
    purely from sketch statistics, as the paper's framework prescribes.
    """
    a = blocks_df.select(
        F.col("block_id").alias("bi"), F.col("payload").alias("pa")
    )
    b = blocks_df.select(
        F.col("block_id").alias("bj"), F.col("payload").alias("pb")
    )
    # one tile per task: the cross-join otherwise collapses into one or
    # two partitions and the all-pairs fan-out loses its parallelism
    pairs = (
        a.crossJoin(b)
        .where(F.col("bi") <= F.col("bj"))
        .repartition(F.col("bi"), F.col("bj"))
    )

    def build(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            out = []
            for row in pdf.itertuples(index=False):
                ba = load_bundle(row.pa)
                bb = load_bundle(row.pb)
                q = kernels.pair_bw_cov(ba["centred"], bb["centred"])
                payload = pickle.dumps(
                    {
                        "ids_i": ba["ids"],
                        "ids_j": bb["ids"],
                        "means_i": ba["means"],
                        "stds_i": ba["stds"],
                        "means_j": bb["means"],
                        "stds_j": bb["stds"],
                        "q": q,
                        "diag": bool(row.bi == row.bj),
                    },
                    protocol=4,
                )
                out.append((row.bi, row.bj, payload))
            yield pd.DataFrame(out, columns=["bi", "bj", "payload"])

    return pairs.mapInPandas(build, schema=PAIR_BLOCK_SCHEMA)


def load_pair_payload(payload: bytes) -> dict:
    """Deserialize a block-pair sketch payload."""
    return pickle.loads(payload)


def pair_tile_arrays(tile: dict) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Flatten a tile into per-pair arrays, excluding self/duplicate pairs.

    Returns (pi, pj, rows) where pi/pj index into the tile's local
    series axes and rows selects the flattened (ni·nj) pair axis. For a
    diagonal tile only i < j pairs are kept; off-diagonal tiles keep the
    full cross product.
    """
    ni = len(tile["ids_i"])
    nj = len(tile["ids_j"])
    gi, gj = np.meshgrid(np.arange(ni), np.arange(nj), indexing="ij")
    pi, pj = gi.reshape(-1), gj.reshape(-1)
    if tile["diag"]:
        keep = pi < pj
        pi, pj = pi[keep], pj[keep]
    rows = pi * nj + pj
    return pi, pj, rows


def build_pair_sketch_rows(long_df: DataFrame, spec: SlidingSpec) -> DataFrame:
    """Pure-Catalyst pairwise bw covariance, one row per (i, j, bw_id).

    q = E[xy] − E[x]E[y] inside each basic window (population covariance),
    for i < j. Self-join on the timestep — Catalyst's shuffle-hash/merge
    join path, intentionally exercised at small N for correctness tests.
    """
    bw = spec.bw
    x = (
        long_df.withColumn("bw_id", (F.col("t") / F.lit(bw)).cast("long"))
        .select(
            F.col("series_id").alias("i"),
            F.col("bw_id"),
            F.col("t"),
            F.col("value").alias("x"),
        )
    )
    y = (
        long_df.withColumn("bw_id", (F.col("t") / F.lit(bw)).cast("long"))
        .select(
            F.col("series_id").alias("j"),
            F.col("bw_id").alias("bw_id_y"),
            F.col("t").alias("t_y"),
            F.col("value").alias("y"),
        )
    )
    joined = x.join(
        y, (x.t == y.t_y) & (x.i < y.j)
    )
    return (
        joined.groupBy("i", "j", "bw_id")
        .agg(
            F.avg(F.col("x") * F.col("y")).alias("exy"),
            F.avg("x").alias("ex"),
            F.avg("y").alias("ey"),
        )
        .select(
            "i",
            "j",
            "bw_id",
            (F.col("exy") - F.col("ex") * F.col("ey")).alias("q"),
        )
    )
