"""Sudowoodo proxy (Wang, Li & Wang [44]) — contrastive self-supervised.

What the substitution preserves (DESIGN.md §2): a *pretraining* phase
over the text representation of **all** pairs (solved + unsolved, no
labels) for many epochs — making it the slowest method end to end, as
in the paper where Sudowoodo takes up to 16 h — followed by a
*semi-supervised* linear head fitted with the same labeling budget as
MoRER. The single global text representation cannot adapt to
heterogeneous per-problem feature distributions, the paper's
explanation for Sudowoodo's weak Dexter/WDC results.

Pretraining learns a projection W over hashed text features by pulling
two noise-augmented views of the same pair together while pushing
random pairs apart (SimCLR-flavoured); scoring re-encodes the text on
the executors via :func:`repro.baselines.textfeat.classify_with_text`.
"""
from __future__ import annotations

import time

import numpy as np

from pyspark.sql import SparkSession

from repro.al import LabelOracle
from repro.baselines.common import BaselineResult
from repro.baselines.textfeat import classify_with_text, pair_text_features
from repro.erdata.splits import ERSetup
from repro.ml import LogisticRegression, model_to_dict

_TEXT_DIM = 64


def _augment(texts, rng: np.random.Generator, p_drop: float = 0.1):
    """Token-dropout augmentation — Sudowoodo's data augmentation op."""
    out = []
    for t in texts:
        toks = [w for w in str(t).split() if rng.random() >= p_drop]
        out.append(" ".join(toks) if toks else str(t))
    return out


def _pretrain(
    text_a,
    text_b,
    dim_out: int,
    epochs: int,
    lr: float,
    rng: np.random.Generator,
) -> np.ndarray:
    """Contrastive projection W via minibatch SGD.

    Each epoch *re-encodes* two token-dropout augmented views of every
    pair (as the real system re-augments per epoch) — this per-epoch
    text encoding is the dominant cost and is exactly why Sudowoodo is
    the slowest method in the paper's Fig. 6.
    """
    n = len(text_a)
    d = _TEXT_DIM + 1
    W = rng.normal(0, 1.0 / np.sqrt(d), size=(d, dim_out))
    batch = 256
    for _ in range(epochs):
        v1 = pair_text_features(
            _augment(text_a, rng), _augment(text_b, rng), dim=_TEXT_DIM
        )
        v2 = pair_text_features(
            _augment(text_a, rng), _augment(text_b, rng), dim=_TEXT_DIM
        )
        order = rng.permutation(n)
        for s in range(0, n, batch):
            idx = order[s : s + batch]
            a, b = v1[idx], v2[idx]
            neg = v1[rng.integers(0, n, len(idx))]
            z1, z2, zn = a @ W, b @ W, neg @ W
            # d/dW of ||z1-z2||^2 - 0.1 ||z1-zn||^2 (align vs. uniformity).
            g = (
                a.T @ (z1 - z2) + b.T @ (z2 - z1)
                - 0.1 * (a.T @ (z1 - zn) + neg.T @ (zn - z1))
            ) / len(idx)
            W -= lr * g
    return W


def run_sudowoodo(
    spark: SparkSession,
    setup: ERSetup,
    budget: int,
    epochs: int = 25,
    dim_out: int = 16,
    seed: int = 0,
) -> BaselineResult:
    t0 = time.perf_counter()
    # Pretraining corpus: the text of *every* pair, labeled or not.
    all_pdf = setup.pairs.select("text_a", "text_b", "label").toPandas()
    rng = np.random.default_rng(seed)
    W = _pretrain(
        all_pdf["text_a"].tolist(), all_pdf["text_b"].tolist(),
        dim_out=dim_out, epochs=epochs, lr=0.01, rng=rng,
    )

    # Semi-supervised head on the *solved* pairs with MoRER's budget.
    init_pdf = setup.init_pairs.select("text_a", "text_b", "label").toPandas()
    Xi = pair_text_features(init_pdf["text_a"], init_pdf["text_b"], dim=_TEXT_DIM)
    yi = init_pdf["label"].to_numpy(np.int64)
    oracle = LabelOracle()
    take = min(budget, len(Xi))
    # Sample across the projected-score range so both classes are seen.
    order = np.argsort((Xi @ W).mean(axis=1))
    pick = order[np.linspace(0, len(order) - 1, take).astype(int)]
    y_lab = oracle.query(yi[pick])
    head = LogisticRegression(n_iter=300).fit(Xi[pick] @ W, y_lab)

    # Fold projection + head into one linear model over the text features.
    final = LogisticRegression()
    final.w = W @ head.w
    final.b = head.b
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    preds = classify_with_text(
        spark, setup.unsolved_pairs, model_to_dict(final), dim=_TEXT_DIM
    ).cache()
    preds.count()
    classify_time = time.perf_counter() - t0
    return BaselineResult(
        name="sudowoodo",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=oracle.spent,
        extra={"pretrain_rows": int(len(all_pdf))},
    )
