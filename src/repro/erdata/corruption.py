"""Per-source corruption profiles.

Each data source gets a :class:`SourceProfile` drawn from a small set of
*archetypes* (clean / typo-heavy / truncating / sparse). Two sources
with the same archetype produce record pairs whose similarity features
are distributed alike — that archetype structure is exactly what
MoRER's distribution analysis clusters, so it must exist in the data
(cf. Fig. 2 in the paper: per-problem Jaccard distributions differ).

Corruption operators mirror the MusicBrainz corruptor of Hildebrandt
et al. (missing values, value-length changes, error ratios) at the
level that matters for similarity features: token drops, char typos,
model truncation, price noise, missing attributes.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class SourceProfile:
    """Corruption intensities for one data source (all probabilities)."""

    archetype: str
    p_token_drop: float = 0.0  # drop each non-model title token
    p_typo: float = 0.0  # per-token char substitution
    p_model_truncate: float = 0.0  # cut the model suffix char
    p_missing_brand: float = 0.0
    p_missing_model: float = 0.0
    p_missing_price: float = 0.0
    price_sigma: float = 0.0  # multiplicative lognormal price noise
    p_token_abbrev: float = 0.0  # shorten a token to its first 3 chars


ARCHETYPES: dict[str, SourceProfile] = {
    "clean": SourceProfile(
        "clean", p_token_drop=0.03, p_typo=0.02, price_sigma=0.01
    ),
    "typo": SourceProfile(
        "typo", p_token_drop=0.10, p_typo=0.25, price_sigma=0.05,
        p_missing_price=0.05,
    ),
    "truncated": SourceProfile(
        "truncated", p_token_drop=0.35, p_typo=0.05, p_model_truncate=0.6,
        p_token_abbrev=0.3, price_sigma=0.03,
    ),
    "sparse": SourceProfile(
        "sparse", p_token_drop=0.15, p_typo=0.08, p_missing_brand=0.35,
        p_missing_model=0.35, p_missing_price=0.30, price_sigma=0.10,
    ),
}

_ALPHABET = "abcdefghijklmnopqrstuvwxyz0123456789"


def _typo(token: str, rng: np.random.Generator) -> str:
    if not token:
        return token
    i = int(rng.integers(0, len(token)))
    return token[:i] + _ALPHABET[rng.integers(0, len(_ALPHABET))] + token[i + 1 :]


def corrupt_record(
    entity: dict, profile: SourceProfile, rng: np.random.Generator
) -> dict:
    """Produce one source record for ``entity`` under ``profile``.

    Returns title/brand/model/price with ``None`` for missing values;
    the title always keeps at least one token so token blocking has a
    key to work with.
    """
    tokens = str(entity["title"]).split()
    kept: list[str] = []
    for t in tokens:
        if rng.random() < profile.p_token_drop and len(tokens) > 1:
            continue
        if rng.random() < profile.p_token_abbrev and len(t) > 4:
            t = t[:3]
        if rng.random() < profile.p_typo:
            t = _typo(t, rng)
        kept.append(t)
    if not kept:
        kept = [tokens[0]]

    brand = None if rng.random() < profile.p_missing_brand else entity["brand"]
    model = entity["model"]
    if rng.random() < profile.p_missing_model:
        model = None
    elif rng.random() < profile.p_model_truncate and len(str(model)) > 3:
        model = str(model)[:-1]
    elif rng.random() < profile.p_typo:
        model = _typo(str(model), rng)

    price = None
    if rng.random() >= profile.p_missing_price:
        price = float(entity["price"]) * float(
            np.exp(rng.normal(0.0, profile.price_sigma))
        )
        price = round(price, 2)

    return {
        "entity_id": int(entity["entity_id"]),
        "title": " ".join(kept),
        "brand": brand,
        "model": model,
        "price": price,
    }
