"""T2 — accuracy: Dangoron vs ParCorr/StatStream against the exact engine.

Paper claim (§4): Dangoron "achieves an accuracy above 90 percent,
comparable to Parcorr".

    spark-submit jobs/table2_accuracy.py [--stations N]
"""
import argparse
import sys


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--stations", type=int, default=None)
    p.add_argument("--out", default="results/table2.txt")
    args = p.parse_args(argv)

    from pyspark.sql import SparkSession

    from repro import experiments
    from repro.harness import format_table, save_table

    spark = (
        SparkSession.builder.appName("table2-accuracy")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    n_stations = args.stations or experiments.T2_N_STATIONS
    rows, meta = experiments.run_table2(spark, n_stations=n_stations)
    text = format_table(
        rows,
        title=(
            f"T2 — accuracy vs exact | beta={meta['beta']} "
            f"exact_edges={meta['exact_edges']}"
        ),
    )
    print(text)
    save_table(text, args.out)


if __name__ == "__main__":
    sys.exit(main())
