"""T5 — update efficiency: streaming sketch maintenance vs full rebuild
(the paper's challenge 1: efficient "network construction and updates").

    spark-submit jobs/table5_streaming.py
"""
import argparse
import sys
import tempfile


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--out", default="results/table5.txt")
    args = p.parse_args(argv)

    import pandas as pd
    from pyspark.sql import SparkSession

    from repro import experiments
    from repro.harness import format_table, save_table

    spark = (
        SparkSession.builder.appName("table5-streaming")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    with tempfile.TemporaryDirectory() as workdir:
        rows, meta, store, rebuild = experiments.run_table5(spark, workdir)
        # correctness: the incrementally-maintained store must equal the
        # rebuilt one exactly
        a = store.series_sketch().round(9)
        b = rebuild.series_sketch().round(9)
        meta["store_matches"] = a.equals(b)
        pd.testing.assert_frame_equal(a, b)
    text = format_table(
        rows,
        title=(
            "T5 — sketch maintenance | "
            f"update_speedup_vs_rebuild={meta['update_speedup_vs_rebuild']:.1f}x "
            f"micro_batches={meta['batches']} store_matches={meta['store_matches']}"
        ),
    )
    print(text)
    save_table(text, args.out)


if __name__ == "__main__":
    sys.exit(main())
