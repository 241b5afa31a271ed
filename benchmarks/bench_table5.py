"""T5 benchmarks — streaming sketch maintenance, writes results/table5.txt."""
import tempfile

import pandas as pd

from repro import experiments
from repro.harness import format_table, save_table


def test_full_table5(benchmark, spark):
    def run():
        with tempfile.TemporaryDirectory() as workdir:
            rows, meta, store, rebuild = experiments.run_table5(spark, workdir)
            a = store.series_sketch().round(9)
            b = rebuild.series_sketch().round(9)
            meta["store_matches"] = a.equals(b)
            pd.testing.assert_frame_equal(a, b)
        text = format_table(
            rows,
            title=(
                "T5 — sketch maintenance | "
                f"update_speedup_vs_rebuild={meta['update_speedup_vs_rebuild']:.1f}x "
                f"micro_batches={meta['batches']} "
                f"store_matches={meta['store_matches']}"
            ),
        )
        save_table(text, "results/table5.txt")
        return rows, meta

    rows, meta = benchmark.pedantic(run, rounds=1, iterations=1)
    assert meta["store_matches"]
    # incremental update beats rebuilding the whole store
    assert meta["update_speedup_vs_rebuild"] > 1.5
