"""Hashed text features — the stand-in for language-model embeddings.

``pair_text_features`` turns the raw record texts of a pair into a
fixed-width vector: per-side token counts hashed into ``dim`` buckets
(stable CRC32, not Python's salted ``hash``) compared bucket-wise, plus
a token-overlap scalar. This gives the Ditto proxy a representation
that is richer than the 4 similarity features (it "sees" the text), at
a per-pair cost that scales with text length — the expensive part of
transformer baselines, in miniature.
"""
from __future__ import annotations

import zlib

import numpy as np
import pandas as pd


def _bucket(token: str, dim: int) -> int:
    return zlib.crc32(token.encode("utf-8")) % dim


def classify_with_text(spark, pairs, model_dict: dict, dim: int):
    """Spark scoring path for text-consuming models (Ditto/Sudowoodo).

    Same mapInPandas shape as :func:`repro.core.classify.classify_pairs`
    but the batches carry the raw texts and are featurised with
    :func:`pair_text_features` on the executors — the per-pair text
    encoding cost lands in classification time, as it does for real
    language-model ER systems.
    """
    from repro.erdata.features import FEATURES
    from repro.ml import model_from_dict

    cols = ["problem_id", "src", "tgt"] + FEATURES + ["label", "text_a", "text_b"]
    slim = pairs.select(*cols).repartition("problem_id")
    bc = spark.sparkContext.broadcast(model_dict)

    def score(batches):
        m = model_from_dict(bc.value)
        for pdf in batches:
            if pdf.empty:
                continue
            X = pair_text_features(pdf["text_a"], pdf["text_b"], dim=dim)
            yield pdf.assign(pred=m.predict(X))[
                ["problem_id", "src", "tgt", "label", "pred"]
            ]

    return slim.mapInPandas(
        score, schema="problem_id string, src long, tgt long, label int, pred int"
    )


def pair_text_features(
    text_a: pd.Series, text_b: pd.Series, dim: int = 32
) -> np.ndarray:
    """(n, dim + 1) features: bucket-wise normalised diffs + Jaccard."""
    n = len(text_a)
    out = np.zeros((n, dim + 1))
    for i, (ta, tb) in enumerate(zip(text_a, text_b)):
        tok_a = str(ta).lower().split()
        tok_b = str(tb).lower().split()
        va = np.zeros(dim)
        vb = np.zeros(dim)
        for t in tok_a:
            va[_bucket(t, dim)] += 1
        for t in tok_b:
            vb[_bucket(t, dim)] += 1
        out[i, :dim] = np.abs(va - vb) / (va + vb + 1.0)
        sa, sb = set(tok_a), set(tok_b)
        out[i, dim] = len(sa & sb) / len(sa | sb) if sa | sb else 0.0
    return out
