"""Similarity distribution analysis (paper §4.2).

Per-(problem, feature) histograms, CDFs and standard deviations are
computed in **one Spark aggregation pass each** over the pair
DataFrame: features are ``posexplode``-d into (feature-index, value)
rows, bucketed into ``n_bins`` bins on [0, 1], and counted. The
resulting summaries are tiny (problems x features x bins), so the
pairwise distribution tests — Kolmogorov–Smirnov (Eq. 1), Wasserstein
distance (Eq. 2), Population Stability Index (Eq. 3) — run driver-side
on NumPy, exactly mirroring the paper's design choice of cheap
univariate tests.

Distances are mapped to similarities (the paper leaves the transform
unspecified; DESIGN.md §5):  KS -> 1-KS,  WD -> 1-WD/|B|,
PSI -> exp(-PSI). ``sim_p`` is the per-feature-std-weighted average.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.erdata.features import FEATURES

#: The paper's bin count |B| = 100 (§4.2, PSI definition).
N_BINS = 100

DISTRIBUTION_TESTS = ("ks", "wd", "psi")

_PSI_EPS = 1e-4  # smoothing so the PSI log ratio is always finite


@dataclass
class ProblemSummary:
    """Distribution summary of one ER problem (or one training set).

    ``hist``/``cdf`` are (n_features, n_bins) proportion arrays,
    ``std`` the per-feature standard deviation, ``n`` the vector count.
    """

    problem_id: str
    hist: np.ndarray
    cdf: np.ndarray
    std: np.ndarray
    n: int


def summarize_problems(
    pairs: DataFrame,
    features: list[str] = FEATURES,
    n_bins: int = N_BINS,
) -> dict[str, ProblemSummary]:
    """Per-problem distribution summaries from a pair DataFrame.

    Two Spark jobs regardless of the number of problems: one
    explode+group for the histograms, one group for std/count.
    """
    t = len(features)
    arr = F.array(*[F.col(f) for f in features])
    counts = (
        pairs.select("problem_id", F.posexplode(arr).alias("fidx", "val"))
        .withColumn(
            "bin",
            F.least(
                F.floor(F.col("val") * n_bins).cast("int"), F.lit(n_bins - 1)
            ),
        )
        .groupBy("problem_id", "fidx", "bin")
        .agg(F.count("*").alias("c"))
        .collect()
    )
    stats = (
        pairs.groupBy("problem_id")
        .agg(
            *[F.stddev_pop(f).alias(f"std_{i}") for i, f in enumerate(features)],
            F.count("*").alias("n"),
        )
        .collect()
    )

    hists: dict[str, np.ndarray] = {}
    for r in counts:
        h = hists.setdefault(r.problem_id, np.zeros((t, n_bins)))
        h[r.fidx, r.bin] = r.c

    out: dict[str, ProblemSummary] = {}
    for r in stats:
        h = hists.get(r.problem_id, np.zeros((t, n_bins)))
        row_sums = h.sum(axis=1, keepdims=True)
        prop = np.divide(h, row_sums, out=np.zeros_like(h), where=row_sums > 0)
        std = np.array(
            [r[f"std_{i}"] if r[f"std_{i}"] is not None else 0.0 for i in range(t)]
        )
        out[r.problem_id] = ProblemSummary(
            problem_id=r.problem_id,
            hist=prop,
            cdf=np.cumsum(prop, axis=1),
            std=std,
            n=int(r.n),
        )
    return out


def summary_from_matrix(
    X: np.ndarray, problem_id: str = "<train>", n_bins: int = N_BINS
) -> ProblemSummary:
    """Driver-side summary of a feature matrix (rows = vectors).

    Used for the per-cluster training-vector sets ``P_{C_i}`` that
    ``sel_base`` compares new problems against (§4.5). Identical
    binning to :func:`summarize_problems`.
    """
    X = np.asarray(X, dtype=np.float64)
    n, t = X.shape
    hist = np.zeros((t, n_bins))
    if n:
        bins = np.minimum((X * n_bins).astype(int), n_bins - 1)
        for f in range(t):
            hist[f] = np.bincount(bins[:, f], minlength=n_bins)
        hist /= n
    return ProblemSummary(
        problem_id=problem_id,
        hist=hist,
        cdf=np.cumsum(hist, axis=1),
        std=X.std(axis=0) if n else np.zeros(t),
        n=n,
    )


# -- distribution tests (per feature) -------------------------------------
def ks_statistic(a: ProblemSummary, b: ProblemSummary, fidx: int) -> float:
    """Kolmogorov–Smirnov statistic (Eq. 1), binned approximation."""
    return float(np.max(np.abs(a.cdf[fidx] - b.cdf[fidx])))


def wasserstein_distance(a: ProblemSummary, b: ProblemSummary, fidx: int) -> float:
    """Wasserstein distance (Eq. 2): L1 between CDF vectors, normalised
    by the bin count so it stays in [0, 1]."""
    n_bins = a.cdf.shape[1]
    return float(np.sum(np.abs(a.cdf[fidx] - b.cdf[fidx])) / n_bins)


def psi(a: ProblemSummary, b: ProblemSummary, fidx: int) -> float:
    """Population Stability Index (Eq. 3) with epsilon smoothing."""
    p = np.clip(a.hist[fidx], _PSI_EPS, None)
    q = np.clip(b.hist[fidx], _PSI_EPS, None)
    p = p / p.sum()
    q = q / q.sum()
    return float(np.sum((p - q) * np.log(p / q)))


def feature_similarity(
    a: ProblemSummary, b: ProblemSummary, fidx: int, test: str
) -> float:
    """Distance of one feature's distributions mapped into [0, 1]."""
    if test == "ks":
        return 1.0 - ks_statistic(a, b, fidx)
    if test == "wd":
        return 1.0 - wasserstein_distance(a, b, fidx)
    if test == "psi":
        return float(np.exp(-psi(a, b, fidx)))
    raise ValueError(f"unknown distribution test: {test!r}")


def problem_similarity(a: ProblemSummary, b: ProblemSummary, test: str = "ks") -> float:
    """Aggregated similarity ``sim_p`` (§4.2): per-feature similarities
    averaged with weights = mean of the two problems' feature stds
    (discriminative features count more)."""
    t = a.hist.shape[0]
    sims = np.array([feature_similarity(a, b, f, test) for f in range(t)])
    weights = (a.std + b.std) / 2.0
    if weights.sum() <= 1e-12:
        return float(sims.mean())
    return float(np.average(sims, weights=weights))
