"""Run any method on an :class:`~repro.erdata.splits.ERSetup` and
measure linkage quality (micro-F1 over P_U, via the Spark TP/FP/FN
aggregation) and per-phase runtime.

``run_method`` is the single entry point the Table 4/5 harnesses and
the jobs use; method names:

==================  =====================================================
``morer_bootstrap``  MoRER + Bootstrap AL (default config)
``morer_almser``     MoRER + Almser AL
``morer_supervised`` MoRER, all P_I vectors labeled (no AL)
``almser``           Almser standalone baseline
``transer_all`` / ``transer_50``   TransER, full / 50 % training data
``ditto_all`` / ``ditto_50``       Ditto proxy, full / 50 % training data
``sudowoodo``        Sudowoodo proxy (same budget as MoRER)
``multiem``          MultiEM proxy (unsupervised)
``anymatch``         AnyMatch proxy (n_r sample)
==================  =====================================================
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.baselines import (
    run_almser_standalone,
    run_anymatch,
    run_ditto,
    run_multiem,
    run_sudowoodo,
    run_transer,
)
from repro.core.morer import MorerConfig, run_morer
from repro.erdata.splits import ERSetup
from repro.ml.metrics import spark_prf

METHODS = (
    "morer_bootstrap",
    "morer_almser",
    "morer_supervised",
    "almser",
    "transer_all",
    "transer_50",
    "ditto_all",
    "ditto_50",
    "sudowoodo",
    "multiem",
    "anymatch",
)


@dataclass
class RunResult:
    """One (method, dataset, budget) measurement."""

    method: str
    dataset: str
    budget: int
    f1: float
    precision: float
    recall: float
    train_time: float
    classify_time: float
    total_time: float
    labels_spent: int
    extra: dict = field(default_factory=dict)


def run_method(
    spark: SparkSession,
    setup: ERSetup,
    method: str,
    budget: int = 500,
    seed: int = 0,
    morer_overrides: dict | None = None,
) -> RunResult:
    """Execute ``method`` on ``setup`` and measure quality + runtime."""
    t0 = time.perf_counter()
    extra: dict = {}
    if method.startswith("morer_"):
        al = method.removeprefix("morer_")
        cfg = MorerConfig(al=al, b_tot=budget, seed=seed, **(morer_overrides or {}))
        res = run_morer(spark, setup, cfg)
        preds = res.predictions
        train_time = (
            res.timings.get("summarize", 0)
            + res.timings.get("cluster", 0)
            + res.timings.get("model_gen", 0)
            + res.timings.get("summarize_new", 0)
            + res.timings.get("selection", 0)
        )
        classify_time = res.timings.get("classify", 0)
        labels = res.labels_spent
        extra = {"n_clusters": len(res.repo.entries), "timings": res.timings}
    else:
        runners = {
            "almser": lambda: run_almser_standalone(spark, setup, budget, seed=seed),
            "transer_all": lambda: run_transer(spark, setup, 1.0, seed=seed),
            "transer_50": lambda: run_transer(spark, setup, 0.5, seed=seed),
            "ditto_all": lambda: run_ditto(spark, setup, 1.0, seed=seed),
            "ditto_50": lambda: run_ditto(spark, setup, 0.5, seed=seed),
            "sudowoodo": lambda: run_sudowoodo(spark, setup, budget, seed=seed),
            "multiem": lambda: run_multiem(spark, setup, seed=seed),
            "anymatch": lambda: run_anymatch(spark, setup, seed=seed),
        }
        if method not in runners:
            raise ValueError(f"unknown method: {method!r}")
        b = runners[method]()
        preds = b.predictions
        train_time = b.train_time
        classify_time = b.classify_time
        labels = b.labels_spent
        extra = dict(b.extra)

    m = spark_prf(preds)
    total = time.perf_counter() - t0
    return RunResult(
        method=method,
        dataset=setup.name,
        budget=budget,
        f1=m["f1"],
        precision=m["precision"],
        recall=m["recall"],
        train_time=train_time,
        classify_time=classify_time,
        total_time=total,
        labels_spent=labels,
        extra=extra,
    )
