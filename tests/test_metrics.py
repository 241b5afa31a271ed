"""Edge metrics on constructed cases."""
import numpy as np
import pandas as pd
import pytest

from repro.metrics import edge_metrics


def cells(rows):
    return pd.DataFrame(rows, columns=["i", "j", "w", "corr"])


class TestEdgeMetrics:
    def test_perfect_match(self):
        e = cells([(0, 1, 0, 0.9), (0, 2, 1, 0.8)])
        m = edge_metrics(e, e.copy())
        assert m["precision"] == m["recall"] == m["f1"] == 1.0
        assert m["value_mae"] == 0.0

    def test_half_recall(self):
        e = cells([(0, 1, 0, 0.9), (0, 2, 1, 0.8)])
        g = cells([(0, 1, 0, 0.9)])
        m = edge_metrics(e, g)
        assert m["recall"] == 0.5 and m["precision"] == 1.0
        assert m["f1"] == pytest.approx(2 / 3)

    def test_false_positive_hits_precision(self):
        e = cells([(0, 1, 0, 0.9)])
        g = cells([(0, 1, 0, 0.9), (3, 4, 2, 0.7)])
        m = edge_metrics(e, g)
        assert m["precision"] == 0.5 and m["recall"] == 1.0

    def test_value_mae_on_common_edges(self):
        e = cells([(0, 1, 0, 0.9), (0, 2, 1, 0.8)])
        g = cells([(0, 1, 0, 0.7), (0, 2, 1, 0.9)])
        m = edge_metrics(e, g)
        assert m["value_mae"] == pytest.approx(0.15)

    def test_orientation_normalised(self):
        e = cells([(1, 0, 0, 0.9)])  # reversed pair orientation
        g = cells([(0, 1, 0, 0.9)])
        m = edge_metrics(e, g)
        assert m["f1"] == 1.0

    def test_empty_exact(self):
        m = edge_metrics(cells([]), cells([]))
        assert m["precision"] == 1.0 and m["recall"] == 1.0
        assert np.isnan(m["value_mae"])

    def test_empty_method_only(self):
        m = edge_metrics(cells([(0, 1, 0, 0.9)]), cells([]))
        assert m["recall"] == 0.0 and m["precision"] == 1.0 and m["f1"] == 0.0

    def test_counts(self):
        e = cells([(0, 1, 0, 0.9), (0, 2, 1, 0.8), (1, 2, 0, 0.85)])
        g = cells([(0, 1, 0, 0.9), (5, 6, 2, 0.8)])
        m = edge_metrics(e, g)
        assert m["n_exact"] == 3 and m["n_method"] == 2 and m["tp"] == 1
