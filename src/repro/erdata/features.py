"""Blocking + similarity feature vectors as a Spark job.

This is the substrate the paper pre-computes offline (it reuses the
Almser feature vectors); here it is a first-class DataFrame pipeline:

1. **Token blocking** — records are keyed by (a) rare title tokens
   (document frequency <= a cap, which drops stop-word-like brand and
   descriptor tokens and keeps discriminative model/typo tokens) and
   (b) a 4-char model-number prefix (robust to suffix truncation and
   the source of family near-miss candidates).
2. **Candidate pairs** — a self-join on the blocking key, restricted to
   the requested ER problems (source pairs), de-duplicated.
3. **Similarity features** — all computed with Spark SQL expressions:
   Jaccard over title token sets (``array_intersect``/``array_union``),
   normalised Levenshtein similarity for brand and model (built-in
   ``levenshtein``), normalised absolute difference for price. Missing
   values yield similarity 0.0. All features live in [0, 1].

Ground-truth ``label`` comes from the generator's entity ids and plays
the role of the paper's human annotator for AL label queries and of the
gold standard for evaluation.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

#: Feature columns every pair DataFrame carries, in canonical order.
FEATURES = ["f_title", "f_brand", "f_model", "f_price"]


def _blocking_keys(records: DataFrame, df_cap: int) -> DataFrame:
    """(source, rid, key) blocking keys after document-frequency pruning."""
    tokens = (
        records.select(
            "source",
            "rid",
            F.explode(
                F.array_distinct(F.split(F.lower(F.col("title")), r"\s+"))
            ).alias("key"),
        )
        .where(F.length("key") >= 3)
    )
    model_prefix = (
        records.where(F.col("model").isNotNull())
        .select(
            "source",
            "rid",
            F.lower(F.substring(F.col("model"), 1, 4)).alias("key"),
        )
        .where(F.length("key") >= 2)
    )
    keys = tokens.unionByName(model_prefix).distinct()
    # Keys occurring once cannot produce a pair; keys occurring more often
    # than the cap are stop-word-like and would blow up the join.
    df_counts = keys.groupBy("key").agg(F.count("*").alias("df"))
    keep = df_counts.where((F.col("df") >= 2) & (F.col("df") <= df_cap))
    return keys.join(keep.select("key"), on="key", how="inner")


def pair_features(
    spark: SparkSession,
    records: DataFrame,
    problems: list[tuple[int, int]],
    df_cap: int | None = None,
) -> DataFrame:
    """Similarity feature vectors for every requested ER problem.

    Parameters
    ----------
    records : output of :func:`repro.erdata.sources.make_records`.
    problems : source pairs ``(k, l)`` with ``k <= l``; ``k == l`` is a
        self-linkage problem (intra-source duplicates).
    df_cap : blocking-key document-frequency cap; default scales with
        the record count.

    Returns
    -------
    DataFrame with columns ``problem_id`` ("k-l"), ``src``, ``tgt``
    (rids, src < tgt within a source), ``f_title f_brand f_model
    f_price``, ``label`` and raw ``text_a`` / ``text_b`` for the
    text-based baseline proxies.
    """
    if df_cap is None:
        n = records.count()
        df_cap = max(15, int(0.02 * n))

    keys = _blocking_keys(records, df_cap)
    a = keys.alias("a")
    b = keys.alias("b")
    problem_ids = [f"{k}-{l}" for k, l in problems]
    cand = (
        a.join(b, F.col("a.key") == F.col("b.key"))
        .where(
            (F.col("a.source") < F.col("b.source"))
            | (
                (F.col("a.source") == F.col("b.source"))
                & (F.col("a.rid") < F.col("b.rid"))
            )
        )
        .select(
            F.concat_ws(
                "-", F.col("a.source"), F.col("b.source")
            ).alias("problem_id"),
            F.col("a.rid").alias("src"),
            F.col("b.rid").alias("tgt"),
        )
        .where(F.col("problem_id").isin(problem_ids))
        .distinct()
    )

    sides = records.withColumn(
        "tokens", F.array_distinct(F.split(F.lower(F.col("title")), r"\s+"))
    ).withColumn(
        "text",
        F.concat_ws(
            " ",
            F.col("title"),
            F.coalesce(F.col("brand"), F.lit("")),
            F.coalesce(F.col("model"), F.lit("")),
            F.coalesce(F.col("price").cast("string"), F.lit("")),
        ),
    )
    ra = sides.select(
        F.col("rid").alias("src"),
        F.col("entity_id").alias("ent_a"),
        F.col("tokens").alias("tok_a"),
        F.col("brand").alias("brand_a"),
        F.col("model").alias("model_a"),
        F.col("price").alias("price_a"),
        F.col("text").alias("text_a"),
    )
    rb = sides.select(
        F.col("rid").alias("tgt"),
        F.col("entity_id").alias("ent_b"),
        F.col("tokens").alias("tok_b"),
        F.col("brand").alias("brand_b"),
        F.col("model").alias("model_b"),
        F.col("price").alias("price_b"),
        F.col("text").alias("text_b"),
    )

    def _edit_sim(x: str, y: str):
        col_x, col_y = F.lower(F.col(x)), F.lower(F.col(y))
        return (
            F.when(F.col(x).isNull() | F.col(y).isNull(), F.lit(0.0))
            .otherwise(
                1.0
                - F.levenshtein(col_x, col_y)
                / F.greatest(F.length(col_x), F.length(col_y), F.lit(1))
            )
            .cast("double")
        )

    union_size = F.size(F.array_union(F.col("tok_a"), F.col("tok_b")))
    price_sim = (
        F.when(F.col("price_a").isNull() | F.col("price_b").isNull(), F.lit(0.0))
        .otherwise(
            F.greatest(
                F.lit(0.0),
                1.0
                - F.abs(F.col("price_a") - F.col("price_b"))
                / F.greatest(F.col("price_a"), F.col("price_b"), F.lit(0.01)),
            )
        )
        .cast("double")
    )

    return (
        cand.join(ra, on="src", how="inner")
        .join(rb, on="tgt", how="inner")
        .select(
            "problem_id",
            "src",
            "tgt",
            F.when(union_size > 0,
                   F.size(F.array_intersect(F.col("tok_a"), F.col("tok_b")))
                   / union_size)
            .otherwise(F.lit(0.0))
            .cast("double")
            .alias("f_title"),
            _edit_sim("brand_a", "brand_b").alias("f_brand"),
            _edit_sim("model_a", "model_b").alias("f_model"),
            price_sim.alias("f_price"),
            (F.col("ent_a") == F.col("ent_b")).cast("int").alias("label"),
            "text_a",
            "text_b",
        )
    )
