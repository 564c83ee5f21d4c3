"""Ditto proxy (Li et al. [19]) — supervised text-representation ER.

What the substitution preserves (DESIGN.md §2): supervised training on
*all* labeled pairs of the solved problems ("all" / "50 %" variants);
epoch-style gradient training (the paper fixes 10 transformer epochs —
our small MLP needs more passes to converge, and its absolute runtime
*understates* Ditto's, which EXPERIMENTS.md notes next to Table 4);
and, crucially, a **text-only** input: the model sees the serialised
records (hashed token buckets), never the engineered similarity
features — which is exactly why the real Ditto confuses Dexter's
near-identical model numbers while MoRER's ``f_model`` feature
separates them (paper §5.3).
"""
from __future__ import annotations

import time

import numpy as np

from pyspark.sql import SparkSession

from repro.baselines.common import BaselineResult, init_pool
from repro.baselines.textfeat import classify_with_text, pair_text_features
from repro.erdata.splits import ERSetup
from repro.ml import MLP, model_to_dict

_TEXT_DIM = 64
_EPOCHS = 150


def run_ditto(
    spark: SparkSession,
    setup: ERSetup,
    train_fraction: float = 1.0,
    epochs: int = _EPOCHS,
    hidden: int = 128,
    seed: int = 0,
) -> BaselineResult:
    t0 = time.perf_counter()
    train = init_pool(setup, fraction=train_fraction, seed=seed)
    X = pair_text_features(train["text_a"], train["text_b"], dim=_TEXT_DIM)
    y = train["label"].to_numpy(np.int64)
    model = MLP(hidden=hidden, epochs=epochs, lr=0.1, batch_size=32, seed=seed)
    model.fit(X, y)
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    preds = classify_with_text(
        spark, setup.unsolved_pairs, model_to_dict(model), dim=_TEXT_DIM
    ).cache()
    preds.count()
    classify_time = time.perf_counter() - t0
    suffix = "all" if train_fraction >= 1.0 else f"{int(train_fraction * 100)}"
    return BaselineResult(
        name=f"ditto_{suffix}",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=len(train),
    )
