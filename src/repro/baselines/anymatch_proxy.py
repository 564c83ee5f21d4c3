"""AnyMatch proxy (Zhang et al. [48]) — small-model, sampled training.

What the substitution preserves (DESIGN.md §2): a deliberately *small*
model (here: logistic regression over similarity + light text features)
trained on a filtered **sample** of ``n_r`` training pairs (AnyMatch's
parameterised sample size, filtered with the training ground truth) —
giving the small-runtime / mid-quality profile the paper reports. The
filter keeps a balanced sample of matches and hard non-matches (the
original filters relevant pairs using the full training ground truth).
"""
from __future__ import annotations

import time

import numpy as np

from pyspark.sql import SparkSession

from repro.baselines.common import BaselineResult, init_pool
from repro.core.classify import classify_pairs
from repro.erdata.features import FEATURES
from repro.erdata.splits import ERSetup
from repro.ml import LogisticRegression, model_to_dict


def run_anymatch(
    spark: SparkSession,
    setup: ERSetup,
    n_r: int = 300,
    seed: int = 0,
) -> BaselineResult:
    t0 = time.perf_counter()
    pool = init_pool(setup)
    rng = np.random.default_rng(seed)
    y = pool["label"].to_numpy(np.int64)
    X = pool[FEATURES].to_numpy(np.float64)
    # Ground-truth-filtered sample: half matches, half *hard* non-matches
    # (highest mean similarity first), as AnyMatch filters relevant pairs.
    pos = np.nonzero(y == 1)[0]
    neg = np.nonzero(y == 0)[0]
    neg_hard = neg[np.argsort(-X[neg].mean(axis=1))]
    n_pos = min(len(pos), n_r // 2)
    n_neg = min(len(neg_hard), n_r - n_pos)
    # Half hard negatives, half random negatives (pure hard negatives
    # would teach a degenerate threshold).
    n_hard = n_neg // 2
    neg_pick = np.concatenate(
        [neg_hard[:n_hard], rng.permutation(neg)[: n_neg - n_hard]]
    )
    idx = np.concatenate([rng.permutation(pos)[:n_pos], neg_pick])
    # A deliberately small (linear) model: the "small language model"
    # capacity profile — fine on clean data, limited on heterogeneous
    # problem mixtures (the paper's WDC finding).
    model = LogisticRegression(n_iter=400).fit(X[idx], y[idx])
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    md = model_to_dict(model)
    preds = classify_pairs(
        spark, setup.unsolved_pairs, {p: md for p in setup.p_unsolved}
    ).cache()
    preds.count()
    classify_time = time.perf_counter() - t0
    return BaselineResult(
        name="anymatch",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=int(len(idx)),
    )
