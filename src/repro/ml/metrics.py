"""Linkage-quality metrics: precision / recall / F1.

Two implementations with identical semantics:

* :func:`prf` — NumPy, for driver-side arrays (AL loops, unit tests);
* :func:`spark_prf` — a single Spark aggregation over a pair DataFrame
  with ``label`` and ``pred`` columns, used by the evaluation harness so
  the metric scales with the classified pair set. Its counts are
  oracle-checked against DuckDB in the test suite.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def prf(y_true: np.ndarray, y_pred: np.ndarray) -> dict[str, float]:
    """Precision, recall and F1 of the match (=1) class."""
    y_true = np.asarray(y_true).astype(np.int64)
    y_pred = np.asarray(y_pred).astype(np.int64)
    tp = int(((y_true == 1) & (y_pred == 1)).sum())
    fp = int(((y_true == 0) & (y_pred == 1)).sum())
    fn = int(((y_true == 1) & (y_pred == 0)).sum())
    return _from_counts(tp, fp, fn)


def _from_counts(tp: int, fp: int, fn: int) -> dict[str, float]:
    p = tp / (tp + fp) if tp + fp else 0.0
    r = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return {"tp": tp, "fp": fp, "fn": fn, "precision": p, "recall": r, "f1": f1}


def spark_prf(
    pairs: DataFrame, label_col: str = "label", pred_col: str = "pred"
) -> dict[str, float]:
    """Micro P/R/F1 over a classified pair DataFrame, one aggregation pass."""
    row = pairs.agg(
        F.sum(((F.col(label_col) == 1) & (F.col(pred_col) == 1)).cast("long")).alias("tp"),
        F.sum(((F.col(label_col) == 0) & (F.col(pred_col) == 1)).cast("long")).alias("fp"),
        F.sum(((F.col(label_col) == 1) & (F.col(pred_col) == 0)).cast("long")).alias("fn"),
    ).collect()[0]
    return _from_counts(int(row.tp or 0), int(row.fp or 0), int(row.fn or 0))


def spark_prf_per_problem(
    pairs: DataFrame, label_col: str = "label", pred_col: str = "pred"
) -> DataFrame:
    """Per-``problem_id`` TP/FP/FN counts (macro-F1 building block)."""
    return pairs.groupBy("problem_id").agg(
        F.sum(((F.col(label_col) == 1) & (F.col(pred_col) == 1)).cast("long")).alias("tp"),
        F.sum(((F.col(label_col) == 0) & (F.col(pred_col) == 1)).cast("long")).alias("fp"),
        F.sum(((F.col(label_col) == 1) & (F.col(pred_col) == 0)).cast("long")).alias("fn"),
    )
