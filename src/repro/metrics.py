"""Accuracy metrics for thresholded correlation networks.

The paper reports a single "accuracy above 90 percent" figure; we report
the standard decomposition for a thresholded edge set — precision,
recall and F1 over (i, j, w) edge identities against the exact engine —
plus the mean absolute error of the correlation values on the common
edges. EXPERIMENTS.md uses F1 as the headline "accuracy" and records
the rest alongside.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _edge_index(cells: pd.DataFrame) -> pd.DataFrame:
    out = cells[["i", "j", "w", "corr"]].copy()
    lo = np.minimum(out["i"], out["j"])
    hi = np.maximum(out["i"], out["j"])
    out["i"], out["j"] = lo, hi
    return out.set_index(["i", "j", "w"]).sort_index()


def edge_metrics(exact: pd.DataFrame, method: pd.DataFrame) -> dict:
    """Precision/recall/F1 of the method's edge set, and value MAE.

    ``exact`` and ``method`` are cell frames (i, j, w, corr) already
    thresholded at the same β. MAE is computed over the intersection of
    the edge sets (where both engines report a value).
    """
    e = _edge_index(exact)
    m = _edge_index(method)
    e_set = e.index
    m_set = m.index
    tp = len(e_set.intersection(m_set))
    precision = tp / len(m_set) if len(m_set) else 1.0
    recall = tp / len(e_set) if len(e_set) else 1.0
    f1 = (
        2 * precision * recall / (precision + recall)
        if (precision + recall) > 0
        else 0.0
    )
    if tp:
        common = e_set.intersection(m_set)
        mae = float(
            np.abs(
                e.loc[common, "corr"].to_numpy()
                - m.loc[common, "corr"].to_numpy()
            ).mean()
        )
    else:
        mae = float("nan")
    return {
        "n_exact": len(e_set),
        "n_method": len(m_set),
        "tp": tp,
        "precision": precision,
        "recall": recall,
        "f1": f1,
        "value_mae": mae,
    }
