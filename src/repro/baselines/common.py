"""Shared plumbing for the baselines."""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.erdata.features import FEATURES
from repro.erdata.splits import ERSetup


@dataclass
class BaselineResult:
    """Uniform result record: predictions + phase timings + label cost."""

    name: str
    predictions: DataFrame  # problem_id, src, tgt, label, pred
    train_time: float
    classify_time: float
    labels_spent: int
    extra: dict = field(default_factory=dict)

    @property
    def total_time(self) -> float:
        return self.train_time + self.classify_time


def init_pool(setup: ERSetup, fraction: float = 1.0, seed: int = 0) -> pd.DataFrame:
    """All initial (solved) pairs as a driver pandas frame.

    ``fraction < 1`` samples the training pairs — the paper's "50 %"
    training-data variants for TransER and Ditto.
    """
    cols = ["problem_id", "src", "tgt"] + FEATURES + ["label", "text_a", "text_b"]
    df = setup.init_pairs.select(*cols)
    if fraction < 1.0:
        df = df.sample(fraction=fraction, seed=seed)
    return df.toPandas()
