"""P_I / P_U construction — the solved/unsolved ER problem split.

Mirrors the paper's setup (§5.2):

* **Dexter** — the *problem list* is split: ``ratio_init`` of the 276
  problems become the initial (solved) set P_I, the rest are P_U.
* **WDC-computer / Music** — each source pair's *record pairs* are
  split 50/50 into a ``#train`` problem (in P_I) and a ``#test``
  problem (in P_U), doubling the problem count (6 -> 12, 10 -> 20).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.erdata.features import pair_features
from repro.erdata.sources import DATASETS, DatasetSpec, make_records


@dataclass
class ERSetup:
    """One dataset instance: records, pair features and the P_I/P_U split."""

    name: str
    spec: DatasetSpec
    records: DataFrame
    pairs: DataFrame  # problem_id, src, tgt, f_*, label, text_a, text_b
    p_init: list[str] = field(default_factory=list)  # P_I problem ids
    p_unsolved: list[str] = field(default_factory=list)  # P_U problem ids

    @property
    def init_pairs(self) -> DataFrame:
        return self.pairs.where(F.col("problem_id").isin(self.p_init))

    @property
    def unsolved_pairs(self) -> DataFrame:
        return self.pairs.where(F.col("problem_id").isin(self.p_unsolved))


def build_problems(
    spark: SparkSession,
    name: str,
    scale: float = 1.0,
    seed: int = 0,
    ratio_init: float = 0.5,
) -> ERSetup:
    """Generate records + pair features and split into P_I / P_U.

    The returned ``pairs`` DataFrame is cached — every downstream step
    (distribution analysis, AL pools, classification, evaluation) scans
    it repeatedly.
    """
    spec = DATASETS[name]
    records = make_records(spark, name, scale=scale, seed=seed)
    problems = [
        (k, l)
        for k in range(spec.n_sources)
        for l in range(k, spec.n_sources)
        if k < l or spec.self_problems
    ]
    pairs = pair_features(spark, records, problems)

    if spec.split == "pair":
        pairs = pairs.withColumn(
            "problem_id",
            F.concat(
                F.col("problem_id"),
                F.when(
                    F.pmod(F.xxhash64("src", "tgt", F.lit(seed)), 2) == 0,
                    F.lit("#train"),
                ).otherwise(F.lit("#test")),
            ),
        )
    pairs = pairs.cache()

    present = sorted(
        r.problem_id for r in pairs.select("problem_id").distinct().collect()
    )
    if spec.split == "pair":
        p_init = [p for p in present if p.endswith("#train")]
        p_unsolved = [p for p in present if p.endswith("#test")]
    else:
        rng = np.random.default_rng(seed + 13)
        order = list(present)
        rng.shuffle(order)
        n_init = max(1, int(round(ratio_init * len(order))))
        p_init = sorted(order[:n_init])
        p_unsolved = sorted(order[n_init:])

    return ERSetup(
        name=name,
        spec=spec,
        records=records,
        pairs=pairs,
        p_init=p_init,
        p_unsolved=p_unsolved,
    )
