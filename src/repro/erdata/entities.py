"""Shared entity universes for the synthetic multi-source datasets.

Every universe uses the paper's running product schema (Fig. 1):
``title`` (free text), ``brand`` (category string), ``model`` (code
string) and ``price`` (numeric). The music universe maps onto the same
schema (title=track, brand=artist, model=album code, price=duration in
seconds) so one feature pipeline serves all three datasets.

Model numbers are generated in *families*: several entities share a
family prefix and differ in a short suffix (``XJ500`` vs ``XJ500B``),
which creates the near-miss non-matches the paper identifies as the
hard part of Dexter.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_BRANDS = [
    "samsung", "sony", "canon", "nikon", "panasonic", "fujifilm",
    "olympus", "leica", "pentax", "kodak", "sigma", "zeiss",
]
_PRODUCT_WORDS = [
    "camera", "dslr", "mirrorless", "compact", "zoom", "digital",
    "pro", "kit", "lens", "body", "bundle", "edition",
]
_DESCRIPTORS = [
    "black", "silver", "wifi", "hd", "uhd", "stabilized", "premium",
    "travel", "sport", "night", "macro", "wide",
]

_ARTIST_FIRST = [
    "john", "maria", "alex", "nina", "paul", "sara", "leo", "mia",
    "omar", "ivy", "hugo", "lena",
]
_ARTIST_LAST = [
    "rivers", "stone", "berg", "fox", "lane", "wolf", "hart", "cole",
    "reed", "vale", "moss", "gray",
]
_SONG_WORDS = [
    "midnight", "summer", "rain", "heart", "fire", "dream", "road",
    "blue", "golden", "echo", "silent", "dance", "river", "light",
    "shadow", "storm", "wild", "home", "lost", "found",
]


def product_universe(n_entities: int, seed: int) -> pd.DataFrame:
    """Product entities: title tokens, brand, family-structured model, price.

    Entities come in model families of ~3: same brand + family prefix,
    different short suffix and slightly different titles/prices.
    """
    rng = np.random.default_rng(seed)
    rows = []
    eid = 0
    while eid < n_entities:
        brand = _BRANDS[rng.integers(0, len(_BRANDS))]
        prefix = (
            chr(ord("a") + rng.integers(0, 26))
            + chr(ord("a") + rng.integers(0, 26))
        ).upper() + str(rng.integers(100, 999))
        family_size = int(rng.integers(1, 4))
        base_words = list(
            rng.choice(_DESCRIPTORS, size=2, replace=False)
        ) + [str(rng.choice(_PRODUCT_WORDS))]
        base_price = float(np.exp(rng.normal(5.5, 0.8)))
        for v in range(family_size):
            if eid >= n_entities:
                break
            suffix = "" if v == 0 else chr(ord("a") + v).upper()
            model = prefix + suffix
            words = list(base_words)
            if v > 0:
                words[rng.integers(0, len(words))] = str(rng.choice(_DESCRIPTORS))
            title = [brand] + words + [model.lower()]
            rows.append(
                {
                    "entity_id": eid,
                    "title": " ".join(title),
                    "brand": brand,
                    "model": model,
                    "price": round(base_price * (1 + 0.15 * v), 2),
                }
            )
            eid += 1
    return pd.DataFrame(rows)


def music_universe(n_entities: int, seed: int) -> pd.DataFrame:
    """Track entities mapped onto the product schema.

    brand=artist, model=album code, price=duration seconds. Cleaner
    structure than products (no near-miss families) — the Music dataset
    is the paper's homogeneous, easier case.
    """
    rng = np.random.default_rng(seed)
    rows = []
    for eid in range(n_entities):
        artist = (
            str(rng.choice(_ARTIST_FIRST)) + " " + str(rng.choice(_ARTIST_LAST))
        )
        n_words = int(rng.integers(2, 5))
        words = list(rng.choice(_SONG_WORDS, size=n_words, replace=False))
        album = f"AL{rng.integers(1000, 9999)}"
        rows.append(
            {
                "entity_id": eid,
                "title": " ".join(words),
                "brand": artist,
                "model": album,
                "price": float(rng.integers(90, 420)),  # track length (s)
            }
        )
    return pd.DataFrame(rows)
