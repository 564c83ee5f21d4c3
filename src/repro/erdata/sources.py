"""Dataset specs and record generation for the three -lite datasets.

``make_records`` materialises the per-source corrupted records as a
Spark DataFrame: generation itself is driver-side pandas (a few
thousand rows), while the quadratic pair/feature work downstream runs
in Spark (``repro.erdata.features``).

Scaling: ``scale=1.0`` is the benchmark size (paper-shaped but ~10-30x
smaller than the originals); tests use ``scale<=0.4``.
"""
from __future__ import annotations

from dataclasses import dataclass, replace

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.erdata import entities
from repro.erdata.corruption import ARCHETYPES, SourceProfile, corrupt_record


@dataclass(frozen=True)
class DatasetSpec:
    """Shape of one synthetic multi-source dataset.

    ``self_problems`` — include (D_k, D_k) ER problems (Dexter has
    intra-source duplicates, so the paper links sources with themselves).
    ``split`` — how P_I/P_U are built: ``"problem"`` splits the problem
    list (Dexter), ``"pair"`` splits each problem's record pairs into a
    train- and a test-problem (WDC-computer, Music).
    """

    name: str
    n_sources: int
    n_entities: int  # at scale=1.0
    recs_per_source: int  # at scale=1.0
    universe: str  # "product" | "music"
    archetypes: tuple[str, ...]  # cycled over sources
    with_replacement: bool  # True -> intra-source duplicates
    self_problems: bool
    split: str  # "problem" | "pair"
    profile_jitter: float = 0.0  # per-source noise on corruption probs


DATASETS: dict[str, DatasetSpec] = {
    # 23 sources, intra-source duplicates -> 23*24/2 = 276 ER problems.
    "dexter": DatasetSpec(
        name="dexter",
        n_sources=23,
        n_entities=400,
        recs_per_source=80,
        universe="product",
        archetypes=("clean", "typo", "truncated", "sparse"),
        with_replacement=True,
        self_problems=True,
        split="problem",
        profile_jitter=0.05,
    ),
    # 4 sources, noisy/impure -> 6 source pairs x {train,test} = 12 problems.
    "wdc": DatasetSpec(
        name="wdc",
        n_sources=4,
        n_entities=300,
        recs_per_source=220,
        universe="product",
        archetypes=("typo", "truncated", "sparse", "typo"),
        with_replacement=False,
        self_problems=False,
        split="pair",
        profile_jitter=0.08,
    ),
    # 5 duplicate-free, fairly clean sources -> 10 pairs x 2 = 20 problems.
    "music": DatasetSpec(
        name="music",
        n_sources=5,
        n_entities=350,
        recs_per_source=260,
        universe="music",
        archetypes=("clean",),
        with_replacement=False,
        self_problems=False,
        split="pair",
        profile_jitter=0.03,
    ),
}


def _jitter(p: SourceProfile, amount: float, rng: np.random.Generator) -> SourceProfile:
    """Perturb a profile's probabilities so sources are not identical."""
    if amount <= 0:
        return p

    def j(x: float) -> float:
        return float(np.clip(x + rng.normal(0.0, amount), 0.0, 0.95))

    return replace(
        p,
        p_token_drop=j(p.p_token_drop),
        p_typo=j(p.p_typo),
        p_model_truncate=j(p.p_model_truncate),
        p_missing_brand=j(p.p_missing_brand),
        p_missing_model=j(p.p_missing_model),
        p_missing_price=j(p.p_missing_price),
        price_sigma=max(0.0, p.price_sigma + float(rng.normal(0, amount / 2))),
        p_token_abbrev=j(p.p_token_abbrev),
    )


def source_profiles(spec: DatasetSpec, seed: int) -> list[SourceProfile]:
    """Deterministic per-source profiles: archetypes cycled + jitter."""
    rng = np.random.default_rng(seed + 1000)
    out = []
    for s in range(spec.n_sources):
        base = ARCHETYPES[spec.archetypes[s % len(spec.archetypes)]]
        out.append(_jitter(base, spec.profile_jitter, rng))
    return out


def make_records(
    spark: SparkSession, name: str, scale: float = 1.0, seed: int = 0
) -> DataFrame:
    """Generate the corrupted multi-source records for dataset ``name``.

    Returns a DataFrame with columns
    ``source, rid, entity_id, title, brand, model, price``; ``rid`` is
    globally unique (``source * 1_000_000 + i``).
    """
    spec = DATASETS[name]
    n_ent = max(10, int(spec.n_entities * scale))
    n_rec = max(5, int(spec.recs_per_source * scale))
    uni = (
        entities.product_universe(n_ent, seed)
        if spec.universe == "product"
        else entities.music_universe(n_ent, seed)
    )
    profiles = source_profiles(spec, seed)
    rng = np.random.default_rng(seed + 7)
    ent_rows = uni.to_dict("records")
    rows = []
    for s, prof in enumerate(profiles):
        n_draw = min(n_rec, n_ent) if not spec.with_replacement else n_rec
        idx = rng.choice(n_ent, size=n_draw, replace=spec.with_replacement)
        for i, e_i in enumerate(idx):
            rec = corrupt_record(ent_rows[int(e_i)], prof, rng)
            rec["source"] = s
            rec["rid"] = s * 1_000_000 + i
            rows.append(rec)
    pdf = pd.DataFrame(rows)[
        ["source", "rid", "entity_id", "title", "brand", "model", "price"]
    ]
    # Explicit schema: object columns with None values must map to
    # nullable strings/doubles, not be inferred from a sample.
    return spark.createDataFrame(
        pdf,
        schema=(
            "source int, rid long, entity_id long, "
            "title string, brand string, model string, price double"
        ),
    )
