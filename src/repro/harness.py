"""Experiment harness: sketch building, timed runs, table formatting.

Jobs (``jobs/table*.py``) and benchmarks compose these helpers; the
formatted tables they print are what EXPERIMENTS.md records next to the
paper's claims.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.sketch.blocks import pack_blocks_from_matrix
from repro.sketch.pair_sketch import build_pair_block_sketch
from repro.tsio.validation import SlidingSpec

DEFAULT_BLOCK_SIZE = 16


@dataclass
class SketchHandle:
    """A cached, materialised pair sketch plus its build time."""

    df: DataFrame
    build_seconds: float
    n_series: int
    block_size: int

    def unpersist(self) -> None:
        self.df.unpersist()


def build_sketch(
    spark: SparkSession,
    X: np.ndarray,
    spec: SlidingSpec,
    block_size: int = DEFAULT_BLOCK_SIZE,
) -> SketchHandle:
    """Build and cache the block-pair sketch; the shared pre-query phase.

    Both engines consume this handle, so "pure query time" (the paper's
    metric) starts after it returns.
    """
    t0 = time.perf_counter()
    blocks = pack_blocks_from_matrix(spark, X, spec, block_size)
    sketch = build_pair_block_sketch(blocks).cache()
    sketch.count()  # materialise the cache before any timing starts
    return SketchHandle(
        sketch, time.perf_counter() - t0, X.shape[0], block_size
    )


def timed_collect(df: DataFrame) -> tuple[pd.DataFrame, float]:
    """Run the query DataFrame to completion and return (rows, seconds)."""
    t0 = time.perf_counter()
    pdf = df.toPandas()
    return pdf, time.perf_counter() - t0


def timed_count(df: DataFrame) -> tuple[int, float]:
    """Run the query to completion and return (row count, seconds).

    The timed action for query benchmarks: the full computation and the
    worker→JVM Arrow transfer run, but the (engine-independent) driver
    materialisation of millions of edge rows is left out — at dense β a
    driver collect costs more than either engine's compute and buries
    the ratio under allocation noise.
    """
    t0 = time.perf_counter()
    n = df.count()
    return n, time.perf_counter() - t0


def format_table(rows: list[dict], title: str | None = None) -> str:
    """Fixed-width text table (markdown-pipe style) from dict rows."""
    if not rows:
        return f"{title}\n(no rows)" if title else "(no rows)"
    headers = list(rows[0].keys())

    def fmt(v) -> str:
        if isinstance(v, float):
            return f"{v:.4g}"
        return str(v)

    cells = [[fmt(r.get(h, "")) for h in headers] for r in rows]
    widths = [
        max(len(h), *(len(c[k]) for c in cells)) for k, h in enumerate(headers)
    ]
    lines = []
    if title:
        lines.append(title)
    lines.append(" | ".join(h.ljust(w) for h, w in zip(headers, widths)))
    lines.append("-|-".join("-" * w for w in widths))
    for c in cells:
        lines.append(" | ".join(v.ljust(w) for v, w in zip(c, widths)))
    return "\n".join(lines)


def save_table(text: str, path: str) -> None:
    """Persist a formatted table under results/ for EXPERIMENTS.md."""
    import os

    os.makedirs(os.path.dirname(path), exist_ok=True)
    with open(path, "w") as fh:
        fh.write(text + "\n")
