"""Dangoron's Spark engine.

The engine is a DataFrame→DataFrame transformation over the cached
block-pair sketch (see DESIGN.md § physical execution): Catalyst plans
the scan of the sketch DataFrame, ``mapInPandas`` runs the frontier
kernel per tile, and Spark accumulators collect the pruning counters
(they materialise once an action runs on the returned DataFrame).

A true JVM physical operator is out of scope in this container (no
Scala toolchain; PySpark cannot register physical operators) — the
Arrow-kernel route is the standard production equivalent.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.jumping import MODES, frontier_query
from repro.sketch.pair_sketch import load_pair_payload
from repro.tsio.validation import SlidingSpec

CELLS_SCHEMA = "i long, j long, w long, corr double"

_STAT_FIELDS = ("cells", "evals", "probes", "jumps", "jump_lengths", "emitted")


class StatsAccumulators:
    """Spark accumulators mirroring ``FrontierStats`` across all tiles.

    Also accumulates ``work_s`` — summed in-kernel seconds across every
    tile task. Wall-clock query time is bottlenecked by the slowest
    tile; total work is the cluster-wide compute the engine consumed,
    the quantity a sequential implementation's "pure query time" would
    show directly.
    """

    def __init__(self, spark: SparkSession):
        sc = spark.sparkContext
        self._acc = {f: sc.accumulator(0) for f in _STAT_FIELDS}
        self._work = sc.accumulator(0.0)

    def add(self, stats) -> None:
        for f in _STAT_FIELDS:
            self._acc[f].add(int(getattr(stats, f)))

    def add_work(self, seconds: float) -> None:
        self._work.add(float(seconds))

    def snapshot(self) -> dict:
        out = {f: self._acc[f].value for f in _STAT_FIELDS}
        out["work_s"] = self._work.value
        out["skipped"] = out["cells"] - out["evals"]
        out["eval_fraction"] = out["evals"] / out["cells"] if out["cells"] else 0.0
        out["mean_jump"] = (
            out["jump_lengths"] / out["jumps"] if out["jumps"] else 0.0
        )
        return out


def query(
    pair_sketch_df: DataFrame,
    spec: SlidingSpec,
    mode: str = "exact-ci",
    stats: StatsAccumulators | None = None,
) -> DataFrame:
    """Thresholded correlation-matrix sequence via Dangoron jumping.

    Returns the network edges (i, j, w, corr) with corr ≥ β; entries
    below β are zero by the problem definition and are not emitted.
    """
    if mode not in MODES:
        raise ValueError(f"unknown bound mode {mode!r}; expected one of {MODES}")

    def run(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        import time as _time

        for pdf in it:
            for row in pdf.itertuples(index=False):
                tile = load_pair_payload(row.payload)
                t0 = _time.perf_counter()
                res = frontier_query(tile, spec, mode)
                if stats is not None:
                    stats.add(res.stats)
                    stats.add_work(_time.perf_counter() - t0)
                yield pd.DataFrame(
                    {"i": res.i, "j": res.j, "w": res.w, "corr": res.corr}
                )

    return pair_sketch_df.mapInPandas(run, schema=CELLS_SCHEMA)
