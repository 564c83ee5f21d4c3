"""Tests for the blocking + similarity-feature Spark job and the splits.

Every aggregation with a SQL equivalent is cross-checked against DuckDB
via ``repro.oracle.assert_equivalent``.
"""
import pytest
from pyspark.sql import functions as F

from repro.erdata import build_problems, make_records, pair_features
from repro.erdata.features import FEATURES
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def wdc(spark):
    return build_problems(spark, "wdc", scale=0.3, seed=0)


@pytest.fixture(scope="module")
def dexter(spark):
    return build_problems(spark, "dexter", scale=0.3, seed=0)


# -- feature ranges and semantics ----------------------------------------
def test_pairs_schema(wdc):
    cols = set(wdc.pairs.columns)
    assert {"problem_id", "src", "tgt", "label", "text_a", "text_b"} <= cols
    assert set(FEATURES) <= cols


def test_features_in_unit_interval(wdc):
    conds = [
        (F.col(f) < 0) | (F.col(f) > 1) | F.col(f).isNull() for f in FEATURES
    ]
    bad = wdc.pairs.where(conds[0] | conds[1] | conds[2] | conds[3]).count()
    assert bad == 0


def test_labels_binary(wdc):
    vals = {r.label for r in wdc.pairs.select("label").distinct().collect()}
    assert vals <= {0, 1} and 1 in vals and 0 in vals


def test_pair_ordering_canonical(wdc):
    """Within a source, src < tgt; across sources, src's source < tgt's."""
    bad = wdc.pairs.where(
        (F.floor(F.col("src") / 1_000_000) > F.floor(F.col("tgt") / 1_000_000))
        | (
            (F.floor(F.col("src") / 1_000_000) == F.floor(F.col("tgt") / 1_000_000))
            & (F.col("src") >= F.col("tgt"))
        )
    ).count()
    assert bad == 0


def test_no_duplicate_pairs(wdc):
    n = wdc.pairs.count()
    assert wdc.pairs.select("problem_id", "src", "tgt").distinct().count() == n


def test_matches_more_similar_than_nonmatches(wdc):
    m = wdc.pairs.groupBy("label").agg(F.avg("f_title").alias("t")).collect()
    avg = {r.label: r.t for r in m}
    assert avg[1] > avg[0] + 0.15


def test_identical_records_get_full_similarity(spark):
    """A record paired with an exact copy in another source scores ~1."""
    import pandas as pd

    recs = spark.createDataFrame(
        pd.DataFrame(
            {
                "source": [0, 1],
                "rid": [1, 1_000_001],
                "entity_id": [42, 42],
                "title": ["samsung ultra camera xj500", "samsung ultra camera xj500"],
                "brand": ["samsung", "samsung"],
                "model": ["XJ500", "XJ500"],
                "price": [100.0, 100.0],
            }
        ),
        schema="source int, rid long, entity_id long, title string, "
        "brand string, model string, price double",
    )
    pairs = pair_features(spark, recs, [(0, 1)], df_cap=10).collect()
    assert len(pairs) == 1
    row = pairs[0]
    for f in FEATURES:
        assert row[f] == pytest.approx(1.0)
    assert row["label"] == 1


def test_missing_attributes_zero_similarity(spark):
    import pandas as pd

    recs = spark.createDataFrame(
        pd.DataFrame(
            {
                "source": [0, 1],
                "rid": [1, 1_000_001],
                "entity_id": [1, 2],
                "title": ["alpha beta xj500", "alpha beta xj500"],
                "brand": [None, "sony"],
                "model": ["XJ500", None],
                "price": [None, 50.0],
            }
        ),
        schema="source int, rid long, entity_id long, title string, "
        "brand string, model string, price double",
    )
    row = pair_features(spark, recs, [(0, 1)], df_cap=10).collect()[0]
    assert row["f_brand"] == 0.0
    assert row["f_model"] == 0.0
    assert row["f_price"] == 0.0
    assert row["label"] == 0


def test_blocking_recall(wdc):
    """Most true cross-source matches must survive blocking."""
    recs = wdc.records
    a = recs.select(
        F.col("source").alias("sa"), F.col("rid").alias("src"), "entity_id"
    )
    b = recs.select(
        F.col("source").alias("sb"), F.col("rid").alias("tgt"), "entity_id"
    )
    truth = a.join(b, on="entity_id").where(F.col("sa") < F.col("sb"))
    n_truth = truth.count()
    found = wdc.pairs.where(F.col("label") == 1).count()
    assert found / n_truth > 0.5


def test_blocking_recall_music_high(spark):
    su = build_problems(spark, "music", scale=0.3, seed=0)
    recs = su.records
    a = recs.select(F.col("source").alias("sa"), F.col("rid").alias("src"), "entity_id")
    b = recs.select(F.col("source").alias("sb"), F.col("rid").alias("tgt"), "entity_id")
    n_truth = a.join(b, on="entity_id").where(F.col("sa") < F.col("sb")).count()
    found = su.pairs.where("label = 1").count()
    assert found / n_truth > 0.7


def test_self_problem_pairs_only_for_dexter(wdc, dexter):
    self_wdc = wdc.pairs.where(
        F.split(F.col("problem_id"), "[-#]").getItem(0)
        == F.split(F.col("problem_id"), "[-#]").getItem(1)
    ).count()
    assert self_wdc == 0
    self_dex = dexter.pairs.where(
        F.split(F.col("problem_id"), "-").getItem(0)
        == F.split(F.col("problem_id"), "-").getItem(1)
    ).count()
    assert self_dex > 0


# -- oracle checks --------------------------------------------------------
def test_oracle_per_problem_counts(wdc):
    got = wdc.pairs.groupBy("problem_id").agg(
        F.count("*").alias("n"), F.sum("label").alias("m")
    )
    assert_equivalent(
        got,
        "SELECT problem_id, count(*) AS n, sum(label) AS m "
        "FROM pairs GROUP BY problem_id",
        pairs=wdc.pairs.drop("text_a", "text_b"),
    )


def test_oracle_price_similarity_recomputed(wdc):
    """Recompute f_price in DuckDB from the raw records and diff."""
    got = wdc.pairs.select("problem_id", "src", "tgt", "f_price")
    sql = """
        SELECT p.problem_id, p.src, p.tgt,
               CASE WHEN a.price IS NULL OR b.price IS NULL THEN 0.0
                    ELSE greatest(0.0, 1.0 - abs(a.price - b.price)
                         / greatest(a.price, b.price, 0.01))
               END AS f_price
        FROM pairs p
        JOIN recs a ON p.src = a.rid
        JOIN recs b ON p.tgt = b.rid
    """
    assert_equivalent(
        got,
        sql,
        pairs=wdc.pairs.select("problem_id", "src", "tgt"),
        recs=wdc.records,
    )


def test_oracle_model_similarity_recomputed(wdc):
    """Recompute f_model (normalised Levenshtein) in DuckDB and diff."""
    got = wdc.pairs.select("problem_id", "src", "tgt", "f_model")
    sql = """
        SELECT p.problem_id, p.src, p.tgt,
               CASE WHEN a.model IS NULL OR b.model IS NULL THEN 0.0
                    ELSE 1.0 - levenshtein(lower(a.model), lower(b.model))
                         / greatest(length(lower(a.model)),
                                    length(lower(b.model)), 1)
               END AS f_model
        FROM pairs p
        JOIN recs a ON p.src = a.rid
        JOIN recs b ON p.tgt = b.rid
    """
    assert_equivalent(
        got,
        sql,
        pairs=wdc.pairs.select("problem_id", "src", "tgt"),
        recs=wdc.records,
    )


def test_title_jaccard_recomputed_in_pandas(wdc):
    """Recompute the token Jaccard driver-side and compare."""
    sample = wdc.pairs.select("src", "tgt", "f_title").limit(200).toPandas()
    recs = wdc.records.select("rid", "title").toPandas().set_index("rid")

    def jac(a, b):
        ta, tb = set(str(a).lower().split()), set(str(b).lower().split())
        return len(ta & tb) / len(ta | tb) if ta | tb else 0.0

    for _, row in sample.iterrows():
        expect = jac(recs.loc[row.src, "title"], recs.loc[row.tgt, "title"])
        assert row.f_title == pytest.approx(expect, abs=1e-9)


# -- splits ---------------------------------------------------------------
def test_dexter_problem_split_ratio(dexter):
    total = len(dexter.p_init) + len(dexter.p_unsolved)
    assert abs(len(dexter.p_init) / total - 0.5) < 0.02
    assert not set(dexter.p_init) & set(dexter.p_unsolved)


def test_dexter_ratio_init_30(spark):
    su = build_problems(spark, "dexter", scale=0.3, seed=0, ratio_init=0.3)
    total = len(su.p_init) + len(su.p_unsolved)
    assert abs(len(su.p_init) / total - 0.3) < 0.02


def test_pair_split_suffixes(wdc):
    assert all(p.endswith("#train") for p in wdc.p_init)
    assert all(p.endswith("#test") for p in wdc.p_unsolved)
    assert len(wdc.p_init) == len(wdc.p_unsolved) == 6


def test_pair_split_partitions_pairs(wdc):
    n = wdc.pairs.count()
    assert wdc.init_pairs.count() + wdc.unsolved_pairs.count() == n


def test_split_deterministic(spark):
    a = build_problems(spark, "music", scale=0.2, seed=3)
    b = build_problems(spark, "music", scale=0.2, seed=3)
    assert a.p_init == b.p_init
    assert a.pairs.count() == b.pairs.count()
