"""Tests for entity universes, corruption and record generation."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.erdata import entities
from repro.erdata.corruption import ARCHETYPES, SourceProfile, corrupt_record
from repro.erdata.sources import DATASETS, make_records, source_profiles


# -- universes ------------------------------------------------------------
def test_product_universe_shape():
    df = entities.product_universe(100, seed=0)
    assert len(df) == 100
    assert set(df.columns) == {"entity_id", "title", "brand", "model", "price"}
    assert df["entity_id"].is_unique
    assert (df["price"] > 0).all()


def test_product_universe_model_families():
    """Family structure: some distinct entities share a 4-char model prefix."""
    df = entities.product_universe(200, seed=1)
    prefixes = df["model"].str[:5]
    assert (prefixes.value_counts() > 1).any()
    assert df["model"].nunique() == len(df)  # but full models are unique


def test_product_universe_deterministic():
    a = entities.product_universe(50, seed=7)
    b = entities.product_universe(50, seed=7)
    assert a.equals(b)


def test_music_universe_shape():
    df = entities.music_universe(80, seed=0)
    assert len(df) == 80
    assert (df["price"] >= 90).all() and (df["price"] <= 420).all()
    assert df["model"].str.startswith("AL").all()


# -- corruption -----------------------------------------------------------
ENTITY = {
    "entity_id": 1,
    "title": "samsung black wifi camera xj500b",
    "brand": "samsung",
    "model": "XJ500B",
    "price": 199.99,
}


def test_clean_profile_barely_corrupts():
    rng = np.random.default_rng(0)
    recs = [corrupt_record(ENTITY, ARCHETYPES["clean"], rng) for _ in range(100)]
    same_title = sum(r["title"] == ENTITY["title"] for r in recs)
    assert same_title > 60
    assert all(r["brand"] == "samsung" for r in recs)


def test_sparse_profile_drops_attributes():
    rng = np.random.default_rng(1)
    recs = [corrupt_record(ENTITY, ARCHETYPES["sparse"], rng) for _ in range(300)]
    assert 0.2 < np.mean([r["brand"] is None for r in recs]) < 0.5
    assert 0.2 < np.mean([r["model"] is None for r in recs]) < 0.5
    assert 0.15 < np.mean([r["price"] is None for r in recs]) < 0.45


def test_truncated_profile_cuts_model():
    rng = np.random.default_rng(2)
    recs = [corrupt_record(ENTITY, ARCHETYPES["truncated"], rng) for _ in range(300)]
    truncated = [r["model"] == "XJ500" for r in recs if r["model"] is not None]
    assert np.mean(truncated) > 0.4


def test_extreme_drop_keeps_one_token():
    prof = SourceProfile("x", p_token_drop=0.99)
    rng = np.random.default_rng(3)
    for _ in range(50):
        r = corrupt_record(ENTITY, prof, rng)
        assert len(r["title"].split()) >= 1


def test_corruption_preserves_entity_id():
    rng = np.random.default_rng(4)
    r = corrupt_record(ENTITY, ARCHETYPES["typo"], rng)
    assert r["entity_id"] == 1


def test_price_noise_magnitude():
    prof = SourceProfile("x", price_sigma=0.05)
    rng = np.random.default_rng(5)
    prices = [corrupt_record(ENTITY, prof, rng)["price"] for _ in range(200)]
    rel = np.abs(np.array(prices) / ENTITY["price"] - 1)
    assert rel.max() < 0.5 and rel.mean() < 0.1


# -- source profiles ------------------------------------------------------
def test_source_profiles_deterministic():
    spec = DATASETS["dexter"]
    assert source_profiles(spec, 0) == source_profiles(spec, 0)
    assert source_profiles(spec, 0) != source_profiles(spec, 1)


def test_source_profiles_cycle_archetypes():
    spec = DATASETS["dexter"]
    profs = source_profiles(spec, 0)
    assert len(profs) == 23
    assert profs[0].archetype == "clean"
    assert profs[1].archetype == "typo"
    assert profs[4].archetype == "clean"


def test_profiles_probabilities_valid():
    for name in DATASETS:
        for p in source_profiles(DATASETS[name], 3):
            for f in (
                p.p_token_drop, p.p_typo, p.p_model_truncate,
                p.p_missing_brand, p.p_missing_model, p.p_missing_price,
                p.p_token_abbrev,
            ):
                assert 0.0 <= f <= 0.95
            assert p.price_sigma >= 0.0


# -- make_records (Spark) -------------------------------------------------
@pytest.fixture(scope="module")
def dexter_records(spark):
    return make_records(spark, "dexter", scale=0.25, seed=0).cache()


def test_records_schema(dexter_records):
    assert set(dexter_records.columns) == {
        "source", "rid", "entity_id", "title", "brand", "model", "price",
    }


def test_records_counts(dexter_records):
    assert dexter_records.select("source").distinct().count() == 23
    per = dexter_records.groupBy("source").count().collect()
    assert all(r["count"] == 20 for r in per)  # 80 * 0.25


def test_rids_globally_unique(dexter_records):
    n = dexter_records.count()
    assert dexter_records.select("rid").distinct().count() == n


def test_dexter_has_intra_source_duplicates(dexter_records):
    dup = (
        dexter_records.groupBy("source", "entity_id")
        .count()
        .where(F.col("count") > 1)
        .count()
    )
    assert dup > 0


def test_music_sources_duplicate_free(spark):
    recs = make_records(spark, "music", scale=0.3, seed=0)
    dup = (
        recs.groupBy("source", "entity_id").count().where(F.col("count") > 1).count()
    )
    assert dup == 0


def test_records_deterministic(spark):
    a = make_records(spark, "wdc", scale=0.2, seed=5).toPandas()
    b = make_records(spark, "wdc", scale=0.2, seed=5).toPandas()
    assert a.equals(b)


def test_records_titles_nonempty(dexter_records):
    assert dexter_records.where(
        F.col("title").isNull() | (F.length("title") == 0)
    ).count() == 0
