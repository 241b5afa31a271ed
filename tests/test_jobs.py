"""Smoke tests for the spark-submit job entrypoints (tiny workloads).

Each job's ``main`` runs end-to-end with a small --stations override,
reusing the session fixture via ``getOrCreate``, and must leave a
formatted table at the requested output path.
"""
import importlib.util
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")


def load_job(name):
    spec = importlib.util.spec_from_file_location(
        name, os.path.join(JOBS_DIR, f"{name}.py")
    )
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.usefixtures("spark")
class TestJobMains:
    def test_table2_accuracy_job(self, tmp_path):
        mod = load_job("table2_accuracy")
        out = str(tmp_path / "t2.txt")
        mod.main(["--stations", "2", "--out", out])
        text = open(out).read()
        assert "T2 — accuracy" in text and "dangoron" in text

    def test_table4_pruning_job(self, tmp_path):
        mod = load_job("table4_pruning")
        out = str(tmp_path / "t4.txt")
        mod.main(["--stations", "2", "--out", out])
        text = open(out).read()
        assert "T4 — pruning" in text and "jump/exact-ci" in text

    def test_table5_streaming_job(self, tmp_path):
        mod = load_job("table5_streaming")
        out = str(tmp_path / "t5.txt")
        mod.main(["--out", out])
        text = open(out).read()
        assert "store_matches=True" in text
