"""MultiEM proxy (Zeng et al. [47]) — unsupervised matching.

What the substitution preserves (DESIGN.md §2): zero labels, the
fastest runtime (no training phase at all), and threshold-based
matching on a global record representation, which underfits
heterogeneous problem mixtures. Per unsolved problem the mean of the
similarity features is thresholded with **Otsu's method** (maximum
between-class variance over the per-problem score histogram — a purely
unsupervised criterion standing in for MultiEM's grid-searched merge
threshold); the histogram is a Spark aggregation, the threshold pick
is driver-side, and the final predicate is a plain Spark expression.
"""
from __future__ import annotations

import time

import numpy as np

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.baselines.common import BaselineResult
from repro.erdata.features import FEATURES
from repro.erdata.splits import ERSetup

_BINS = 50


def _otsu(counts: np.ndarray) -> float:
    """Otsu threshold on a histogram over [0, 1]; returns the cut point."""
    total = counts.sum()
    if total == 0:
        return 0.5
    bins = len(counts)
    centers = (np.arange(bins) + 0.5) / bins
    w0 = np.cumsum(counts)
    w1 = total - w0
    mu0 = np.cumsum(counts * centers) / np.maximum(w0, 1e-12)
    mu_tot = (counts * centers).sum() / total
    mu1 = (mu_tot * total - np.cumsum(counts * centers)) / np.maximum(w1, 1e-12)
    between = w0 * w1 * (mu0 - mu1) ** 2
    k = int(np.argmax(between[:-1]))  # last cut would leave one class empty
    return float((k + 1) / bins)


def run_multiem(spark: SparkSession, setup: ERSetup, seed: int = 0) -> BaselineResult:
    t0 = time.perf_counter()
    mean_sim = sum(F.col(f) for f in FEATURES) / len(FEATURES)
    scored = setup.unsolved_pairs.withColumn("ms", mean_sim).withColumn(
        "bin", F.least(F.floor(F.col("ms") * _BINS).cast("int"), F.lit(_BINS - 1))
    )
    hist_rows = (
        scored.groupBy("problem_id", "bin").agg(F.count("*").alias("c")).collect()
    )
    hists: dict[str, np.ndarray] = {}
    for r in hist_rows:
        hists.setdefault(r.problem_id, np.zeros(_BINS))[r.bin] = r.c
    thresholds = {pid: _otsu(h) for pid, h in hists.items()}
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    mapping = F.create_map(
        *[x for pid, thr in sorted(thresholds.items()) for x in (F.lit(pid), F.lit(thr))]
    )
    preds = (
        scored.withColumn("thr", F.coalesce(mapping[F.col("problem_id")], F.lit(0.5)))
        .withColumn("pred", (F.col("ms") >= F.col("thr")).cast("int"))
        .select("problem_id", "src", "tgt", "label", "pred")
        .cache()
    )
    preds.count()
    classify_time = time.perf_counter() - t0
    return BaselineResult(
        name="multiem",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=0,
        extra={"thresholds": thresholds},
    )
