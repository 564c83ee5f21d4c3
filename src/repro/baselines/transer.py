"""TransER-lite (Kirielle, Christen & Ranbaduge [15]).

Homogeneous transfer learning: for every unsolved (target) ER problem,
each target feature vector is compared with **all** labeled source
vectors (the solved problems' pairs); the k nearest source neighbours
pseudo-label the target vector when their label agreement exceeds the
confidence threshold ``t_c``; a target model is then trained on the
confident pseudo-labels and classifies the whole target problem.

The exhaustive target-x-source comparison is TransER's documented cost
(paper §5.3: "compares each unsolved feature vector with all feature
vectors from the integrated ER tasks") — it is kept, chunked so the
distance matrix never materialises fully.
"""
from __future__ import annotations

import time

import numpy as np

from pyspark.sql import SparkSession

from repro.baselines.common import BaselineResult, init_pool
from repro.core.classify import classify_pairs
from repro.erdata.features import FEATURES
from repro.erdata.splits import ERSetup
from repro.ml import RandomForest, model_to_dict


def _pseudo_labels(
    Xt: np.ndarray, Xs: np.ndarray, ys: np.ndarray, k: int, t_c: float
) -> tuple[np.ndarray, np.ndarray]:
    """kNN pseudo labels for target vectors; returns (labels, confident)."""
    n_t = Xt.shape[0]
    labels = np.zeros(n_t, dtype=np.int64)
    confident = np.zeros(n_t, dtype=bool)
    chunk = max(1, min(512, n_t))
    for start in range(0, n_t, chunk):
        block = Xt[start : start + chunk]
        # (chunk, n_s) squared euclidean distances.
        d2 = (
            (block**2).sum(axis=1)[:, None]
            - 2.0 * block @ Xs.T
            + (Xs**2).sum(axis=1)[None, :]
        )
        nn = np.argpartition(d2, min(k, d2.shape[1] - 1), axis=1)[:, :k]
        votes = ys[nn].mean(axis=1)
        lab = (votes >= 0.5).astype(np.int64)
        conf = np.maximum(votes, 1.0 - votes) >= t_c
        labels[start : start + chunk] = lab
        confident[start : start + chunk] = conf
    return labels, confident


def _structural_filter(
    Xt: np.ndarray, labels: np.ndarray, confident: np.ndarray, k: int, t_l: float
) -> np.ndarray:
    """TransER's structural-similarity check (threshold ``t_l``).

    A confident pseudo-label survives only if the target vector's own
    k-nearest *target* neighbourhood agrees with it — the second
    all-pairs comparison that dominates TransER's runtime.
    """
    n_t = Xt.shape[0]
    keep = confident.copy()
    if n_t < 3:
        return keep
    chunk = max(1, min(512, n_t))
    kk = min(k, n_t - 1)
    for start in range(0, n_t, chunk):
        block = Xt[start : start + chunk]
        d2 = (
            (block**2).sum(axis=1)[:, None]
            - 2.0 * block @ Xt.T
            + (Xt**2).sum(axis=1)[None, :]
        )
        # Exclude self (distance 0 at the own index).
        rows = np.arange(start, min(start + chunk, n_t))
        d2[np.arange(len(rows)), rows] = np.inf
        nn = np.argpartition(d2, kk, axis=1)[:, :kk]
        agree = (labels[nn] == labels[rows][:, None]).mean(axis=1)
        keep[rows] &= agree >= t_l
    return keep


def run_transer(
    spark: SparkSession,
    setup: ERSetup,
    train_fraction: float = 1.0,
    k: int = 10,
    t_c: float = 0.9,
    t_l: float = 0.9,
    seed: int = 0,
) -> BaselineResult:
    """TransER over all unsolved problems; paper params k=10, t_c=t_l=0.9."""
    t0 = time.perf_counter()
    source = init_pool(setup, fraction=train_fraction, seed=seed)
    Xs = source[FEATURES].to_numpy(np.float64)
    ys = source["label"].to_numpy(np.int64)

    cols = ["problem_id", "src", "tgt"] + FEATURES + ["label"]
    targets = setup.unsolved_pairs.select(*cols).toPandas()
    model_by_problem: dict[str, dict] = {}
    for pid, grp in targets.groupby("problem_id", sort=True):
        Xt = grp[FEATURES].to_numpy(np.float64)
        labels, confident = _pseudo_labels(Xt, Xs, ys, k=k, t_c=t_c)
        confident = _structural_filter(Xt, labels, confident, k=k, t_l=t_l)
        if confident.sum() < 2 or len(set(labels[confident])) < 2:
            # Not enough confident pseudo labels: fall back to a source
            # model (TransER's degenerate case).
            m = RandomForest(n_estimators=10, max_depth=8, seed=seed)
            m.fit(Xs, ys)
        else:
            m = RandomForest(n_estimators=10, max_depth=8, seed=seed)
            m.fit(Xt[confident], labels[confident])
        model_by_problem[pid] = model_to_dict(m)
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    preds = classify_pairs(spark, setup.unsolved_pairs, model_by_problem).cache()
    preds.count()
    classify_time = time.perf_counter() - t0
    suffix = "all" if train_fraction >= 1.0 else f"{int(train_fraction * 100)}"
    return BaselineResult(
        name=f"transer_{suffix}",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=len(source),
    )
