"""End-to-end MoRER pipeline (paper Fig. 3).

``init_repository`` builds the model repository from the solved
problems P_I (distribution analysis -> problem graph -> Leiden
clustering -> budget distribution -> per-cluster AL -> models), and
``solve`` classifies the unsolved problems P_U with ``sel_base`` or
``sel_cov``. ``run_morer`` chains both and times every phase.

Layering: distribution summaries and classification run in Spark; the
per-cluster AL loops pull a *cluster's* pool to the driver (clusters
are small — shrinking the AL search space is MoRER's efficiency
argument) and the label oracle accounts for every revealed label.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.al import LabelOracle, almser_al, bootstrap_al
from repro.al.bootstrap import record_scores
from repro.core.budget import BudgetPlan, ClusterInfo, distribute_budget
from repro.core.classify import classify_pairs
from repro.core.distribution import (
    ProblemSummary,
    summarize_problems,
    summary_from_matrix,
)
from repro.core.problem_graph import build_problem_graph, cluster_problems
from repro.core.repository import ClusterEntry, ModelRepository
from repro.core.selection import sel_base, sel_cov
from repro.erdata.features import FEATURES
from repro.erdata.splits import ERSetup
from repro.ml import RandomForest, model_to_dict


@dataclass
class MorerConfig:
    """Parameter grid of Table 3 (defaults in bold there)."""

    test: str = "ks"  # ks | wd | psi
    al: str = "bootstrap"  # bootstrap | almser | supervised
    selection: str = "base"  # base | cov
    b_tot: int = 500
    b_min: int = 20
    batch: int = 10  # Almser-AL batch inside MoRER
    batch_bootstrap: int = 25  # Bootstrap AL scales with larger batches
    k_bootstrap: int = 100  # the paper's k=100 bootstrap committee
    committee_size: int = 100  # forest-committee size of the Almser AL
    t_cov: float = 0.25
    n_bins: int = 100
    clustering: str = "leiden"  # leiden | label_prop
    resolution: float = 1.0
    prune: str | float | None = "median"
    use_record_scores: bool = True
    seed: int = 0


@dataclass
class MorerResult:
    repo: ModelRepository
    assignment: dict[str, int]  # unsolved problem -> cluster used
    predictions: DataFrame  # problem_id, src, tgt, label, pred
    timings: dict[str, float] = field(default_factory=dict)
    labels_spent: int = 0


class _PoolCache:
    """One collect of the pair vectors, sliced per cluster in pandas.

    The AL loop is inherently driver-side; a single ``toPandas`` beats
    one Spark collect per cluster (which would add seconds of fixed
    job overhead per cluster). Bounded by the dataset scale factor.
    """

    def __init__(self, setup: ERSetup):
        self._setup = setup
        self._pdf: pd.DataFrame | None = None

    def get(self, problem_ids: list[str]) -> pd.DataFrame:
        if self._pdf is None:
            cols = ["problem_id", "src", "tgt"] + FEATURES + ["label"]
            self._pdf = self._setup.pairs.select(*cols).toPandas()
        out = self._pdf[self._pdf["problem_id"].isin(set(problem_ids))]
        return out.reset_index(drop=True)


def _train_on_pool(
    pool: pd.DataFrame,
    budget: int,
    oracle: LabelOracle,
    cfg: MorerConfig,
    partition: dict[str, int],
    n_clusters: int,
    seed: int,
) -> tuple[RandomForest, pd.DataFrame]:
    """Dispatch to the configured model-generation method."""
    if cfg.al == "supervised":
        y = oracle.query(pool["label"].to_numpy(dtype=np.int64))
        model = RandomForest(n_estimators=20, max_depth=8, seed=seed)
        model.fit(pool[FEATURES].to_numpy(dtype=np.float64)[: len(y)], y)
        return model, pool.iloc[: len(y)]
    if cfg.al == "bootstrap":
        scores = (
            record_scores(pool, partition, n_clusters)
            if cfg.use_record_scores
            else None
        )
        return bootstrap_al(
            pool, budget, oracle,
            k=cfg.k_bootstrap, batch=cfg.batch_bootstrap, seed=seed,
            scores=scores,
        )
    if cfg.al == "almser":
        return almser_al(
            pool, budget, oracle,
            committee_size=cfg.committee_size, batch=cfg.batch, seed=seed,
        )
    raise ValueError(f"unknown model generation method: {cfg.al!r}")


def _make_entry(
    cid: int,
    problem_ids: list[str],
    model: RandomForest,
    labeled: pd.DataFrame,
    budget: int,
) -> ClusterEntry:
    X = labeled[FEATURES].to_numpy(dtype=np.float64)
    return ClusterEntry(
        cid=cid,
        problem_ids=sorted(problem_ids),
        model=model_to_dict(model),
        train_summary=summary_from_matrix(X, problem_id=f"<cluster {cid}>"),
        n_train=len(labeled),
        budget_assigned=budget,
        train_X=X,
        train_y=labeled["label"].to_numpy(dtype=np.int64),
    )


def _singleton_affinity(
    partition: dict[str, int], graph, clusters: list[ClusterInfo]
) -> dict[int, int]:
    """Best non-singleton host per singleton cluster: max mean edge
    weight from the singleton's problem to the host's problems."""
    non_singletons = [c for c in clusters if not c.is_singleton]
    out: dict[int, int] = {}
    for c in clusters:
        if not c.is_singleton or not non_singletons:
            continue
        p = c.problem_ids[0]
        best, best_w = None, -1.0
        for host in non_singletons:
            ws = [graph.weight(p, q) for q in host.problem_ids]
            w = float(np.mean(ws)) if ws else 0.0
            if w > best_w:
                best, best_w = host.cid, w
        out[c.cid] = best
    return out


def init_repository(
    spark: SparkSession, setup: ERSetup, cfg: MorerConfig
) -> tuple[ModelRepository, dict[str, float]]:
    """Steps 1–3 of Fig. 3: analyse, cluster, generate models."""
    timings: dict[str, float] = {}

    t0 = time.perf_counter()
    summaries = summarize_problems(setup.init_pairs, n_bins=cfg.n_bins)
    timings["summarize"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    graph = build_problem_graph(summaries, cfg.test, cfg.prune)
    partition = cluster_problems(
        graph, algorithm=cfg.clustering, seed=cfg.seed, resolution=cfg.resolution
    )
    timings["cluster"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    groups: dict[int, list[str]] = {}
    for p, c in partition.items():
        groups.setdefault(c, []).append(p)
    clusters = [
        ClusterInfo(cid=c, problem_ids=sorted(ps),
                    n_vectors=sum(summaries[p].n for p in ps))
        for c, ps in sorted(groups.items())
    ]
    affinity = _singleton_affinity(partition, graph, clusters)
    plan: BudgetPlan = distribute_budget(
        clusters, b_tot=cfg.b_tot, b_min=cfg.b_min, singleton_affinity=affinity
    )
    for singleton_cid, host in plan.merged_into.items():
        for p in groups.pop(singleton_cid, []):
            partition[p] = host
            groups.setdefault(host, []).append(p)

    repo = ModelRepository(test=cfg.test)
    repo.summaries = dict(summaries)
    repo.graph = graph
    repo.partition = dict(partition)
    oracle = LabelOracle()
    pools = _PoolCache(setup)
    n_clusters = len(groups)
    for cid in sorted(groups):
        members = sorted(groups[cid])
        pool = pools.get(members)
        if pool.empty:
            continue
        budget = plan.per_cluster.get(cid, cfg.b_min)
        model, labeled = _train_on_pool(
            pool, budget, oracle, cfg, partition, n_clusters, seed=cfg.seed + cid
        )
        repo.entries[cid] = _make_entry(cid, members, model, labeled, budget)
        repo.trained_problems.update(members)
    repo.labels_spent = oracle.spent
    timings["model_gen"] = time.perf_counter() - t0
    return repo, timings


def solve(
    spark: SparkSession,
    setup: ERSetup,
    repo: ModelRepository,
    cfg: MorerConfig,
) -> MorerResult:
    """Steps 4–5 of Fig. 3: pick a model per unsolved problem, classify."""
    timings: dict[str, float] = {}
    t0 = time.perf_counter()
    summaries_u = summarize_problems(setup.unsolved_pairs, n_bins=cfg.n_bins)
    timings["summarize_new"] = time.perf_counter() - t0

    oracle = LabelOracle()
    pools = _PoolCache(setup)
    assignment: dict[str, int] = {}
    t0 = time.perf_counter()
    if cfg.selection == "base":
        for pid in sorted(summaries_u):
            assignment[pid] = sel_base(repo, summaries_u[pid])
    elif cfg.selection == "cov":
        default_budget = max(
            cfg.b_min, cfg.b_tot // max(1, len(repo.entries))
        )

        def vector_count(p: str) -> int:
            if p in repo.summaries:
                return repo.summaries[p].n
            return summaries_u[p].n if p in summaries_u else 0

        def train_new_cluster(members: list[str], budget: int) -> int:
            pool = pools.get(members)
            if pool.empty:
                return sel_base(repo, summaries_u[members[0]])
            model, labeled = _train_on_pool(
                pool, budget, oracle, cfg, repo.partition,
                len(repo.entries) + 1, seed=cfg.seed + 101,
            )
            cid = repo.next_cid()
            repo.entries[cid] = _make_entry(cid, members, model, labeled, budget)
            repo.trained_problems.update(members)
            return cid

        def retrain_cluster(cid: int, untrained: list[str], budget: int) -> None:
            pool = pools.get(untrained)
            if pool.empty:
                return
            model, labeled = _train_on_pool(
                pool, budget, oracle, cfg, repo.partition,
                len(repo.entries), seed=cfg.seed + 211 + cid,
            )
            e = repo.entries[cid]
            X = np.vstack([e.train_X, labeled[FEATURES].to_numpy(np.float64)])
            y = np.concatenate(
                [e.train_y, labeled["label"].to_numpy(np.int64)]
            )
            merged = RandomForest(n_estimators=20, max_depth=8, seed=cfg.seed)
            merged.fit(X, y)
            e.model = model_to_dict(merged)
            e.train_X, e.train_y = X, y
            e.n_train = len(y)
            e.train_summary = summary_from_matrix(X, f"<cluster {cid}>")
            e.problem_ids = sorted(set(e.problem_ids) | set(untrained))
            repo.trained_problems.update(untrained)

        for pid in sorted(summaries_u):
            assignment[pid] = sel_cov(
                repo,
                summaries_u[pid],
                vector_count=vector_count,
                train_new_cluster=train_new_cluster,
                retrain_cluster=retrain_cluster,
                t_cov=cfg.t_cov,
                default_budget=default_budget,
                prune=cfg.prune,
                clustering=cfg.clustering,
                seed=cfg.seed,
            )
    else:
        raise ValueError(f"unknown selection method: {cfg.selection!r}")
    timings["selection"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    model_by_problem = {
        pid: repo.entries[cid].model
        for pid, cid in assignment.items()
        if cid in repo.entries
    }
    preds = classify_pairs(spark, setup.unsolved_pairs, model_by_problem)
    preds = preds.cache()
    preds.count()  # materialise so classification time is measured here
    timings["classify"] = time.perf_counter() - t0

    repo.labels_spent += oracle.spent
    return MorerResult(
        repo=repo,
        assignment=assignment,
        predictions=preds,
        timings=timings,
        labels_spent=repo.labels_spent,
    )


def run_morer(
    spark: SparkSession, setup: ERSetup, cfg: MorerConfig | None = None
) -> MorerResult:
    """Initialise the repository from P_I and solve P_U."""
    cfg = cfg or MorerConfig()
    t0 = time.perf_counter()
    repo, t_init = init_repository(spark, setup, cfg)
    result = solve(spark, setup, repo, cfg)
    result.timings = {**t_init, **result.timings}
    result.timings["total"] = time.perf_counter() - t0
    return result
