"""Apply repository models to record pairs — the Spark scoring path.

``classify_pairs`` broadcasts the (small, dict-serialised) models and
runs them inside ``mapInPandas`` over the pair DataFrame repartitioned
by ``problem_id``: every partition deserialises each needed model once,
scores its groups vectorised with NumPy, and emits a ``pred`` column.
This is the "stored models applied as UDFs over partitioned record
pairs" dataflow — classification scales with Spark regardless of how
many pairs an unsolved problem has.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.erdata.features import FEATURES
from repro.ml import model_from_dict


def classify_pairs(
    spark: SparkSession,
    pairs: DataFrame,
    model_by_problem: dict[str, dict],
    features: list[str] = FEATURES,
) -> DataFrame:
    """Score ``pairs`` with the per-problem models.

    Returns ``problem_id, src, tgt, label, pred``; pairs of problems
    without an assigned model predict 0 (non-match) — an unsolved
    problem must never silently borrow another problem's model.
    """
    cols = ["problem_id", "src", "tgt"] + features + ["label"]
    slim = pairs.select(*cols).repartition("problem_id")
    bc = spark.sparkContext.broadcast(model_by_problem)
    out_schema = "problem_id string, src long, tgt long, label int, pred int"

    def score(batches):
        import numpy as np  # executors import locally

        cache: dict[str, object] = {}
        for pdf in batches:
            if pdf.empty:
                continue
            pred = np.zeros(len(pdf), dtype=np.int64)
            for pid, grp in pdf.groupby("problem_id", sort=False):
                md = bc.value.get(pid)
                if md is None:
                    continue
                if pid not in cache:
                    cache[pid] = model_from_dict(md)
                X = grp[features].to_numpy(dtype=np.float64)
                pred[pdf.index.get_indexer(grp.index)] = cache[pid].predict(X)
            yield pdf.assign(pred=pred)[
                ["problem_id", "src", "tgt", "label", "pred"]
            ]

    return slim.mapInPandas(score, schema=out_schema)
