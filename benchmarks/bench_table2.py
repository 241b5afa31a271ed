"""T2 benchmarks — accuracy harness (paper §4: >90%, comparable to ParCorr).

Benchmarks the approximate baselines' query paths and runs the full
accuracy table, writing results/table2.txt.
"""
import pytest

from repro import experiments
from repro.baselines import parcorr, statstream
from repro.harness import format_table, save_table, timed_count
from repro.synth_data import uscrn_like


@pytest.fixture(scope="module")
def X():
    return uscrn_like(
        n_stations=experiments.T2_N_STATIONS, n_hours=experiments.T1_HOURS, seed=8
    )


def test_parcorr_query(benchmark, spark, X):
    benchmark.pedantic(
        lambda: timed_count(parcorr.query(spark, X, experiments.T2_SPEC, d=32)),
        rounds=3,
        iterations=1,
    )


def test_statstream_query(benchmark, spark, X):
    benchmark.pedantic(
        lambda: timed_count(
            statstream.query(spark, X, experiments.T2_SPEC, n_coef=16)
        ),
        rounds=3,
        iterations=1,
    )


def test_full_table2(benchmark, spark):
    def run():
        rows, meta = experiments.run_table2(spark)
        text = format_table(
            rows,
            title=(
                f"T2 — accuracy vs exact | beta={meta['beta']} "
                f"exact_edges={meta['exact_edges']}"
            ),
        )
        save_table(text, "results/table2.txt")
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    by = {r["method"]: r for r in rows}
    # the paper's accuracy band: Dangoron above 90%, comparable to ParCorr
    assert by["dangoron"]["f1"] >= 0.9
    assert by["dangoron"]["precision"] == 1.0  # emitted values are exact
    assert abs(by["dangoron"]["f1"] - by["parcorr(d=32,verified)"]["f1"]) < 0.15
