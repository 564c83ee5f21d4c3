"""Almser as a standalone baseline (Primpeli & Bizer [30]).

One graph-boosted AL run over the pool of **all** initial ER problems
at once — no clustering, one model for everything. The per-iteration
committee prediction and match-graph construction over the full pool is
what makes this slower than MoRER+Almser (which hands Almser one
cluster at a time); the paper's Table 4 speedups hinge on exactly this.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from repro.al import LabelOracle, almser_al
from repro.baselines.common import BaselineResult, init_pool
from repro.core.classify import classify_pairs
from repro.erdata.splits import ERSetup
from repro.ml import model_to_dict


def run_almser_standalone(
    spark: SparkSession,
    setup: ERSetup,
    budget: int,
    batch: int = 5,
    committee_size: int = 100,
    seed: int = 0,
) -> BaselineResult:
    """Standalone Almser: full pool, forest committee of 100, small
    batches (the original selects pairs near-individually; batch=5 is
    our batch-processing extension, cf. §5.2)."""
    t0 = time.perf_counter()
    pool = init_pool(setup)
    oracle = LabelOracle()
    model, _ = almser_al(
        pool, budget, oracle,
        committee_size=committee_size, batch=batch, seed=seed,
    )
    train_time = time.perf_counter() - t0

    t0 = time.perf_counter()
    md = model_to_dict(model)
    preds = classify_pairs(
        spark, setup.unsolved_pairs, {p: md for p in setup.p_unsolved}
    ).cache()
    preds.count()
    classify_time = time.perf_counter() - t0
    return BaselineResult(
        name="almser",
        predictions=preds,
        train_time=train_time,
        classify_time=classify_time,
        labels_spent=oracle.spent,
    )
