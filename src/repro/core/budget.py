"""Labeling-budget distribution over clusters (paper §4.4, Eqs. 4–9)
and the retraining budget for ``sel_cov`` (Eq. 14).

Semantics implemented:

* every cluster is guaranteed ``b_min`` labels (Eq. 5 reserves them);
* if even the minima exceed ``b_tot`` (Eq. 4), singleton clusters are
  merged into their most similar non-singleton cluster first, and if
  the minima still do not fit, ``b_min`` itself is lowered;
* the remaining budget is split between the non-singleton and the
  singleton cluster groups proportionally to how many ER *problems*
  each group contains (Eqs. 6–7), and within a group proportionally to
  the clusters' total feature-vector counts (Eqs. 8–9);
* a cluster's budget never exceeds its vector count; freed surplus is
  re-assigned to the other clusters of the same group.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class ClusterInfo:
    """Budget-relevant view of one cluster."""

    cid: int
    problem_ids: list[str]
    n_vectors: int  # C^i_{|tot}, Eq. 8

    @property
    def is_singleton(self) -> bool:
        return len(self.problem_ids) == 1


@dataclass
class BudgetPlan:
    """Result of the distribution: labels per cluster + applied merges."""

    per_cluster: dict[int, int]
    merged_into: dict[int, int] = field(default_factory=dict)  # singleton -> host
    b_min_used: int = 0

    @property
    def total(self) -> int:
        return sum(self.per_cluster.values())


def distribute_budget(
    clusters: list[ClusterInfo],
    b_tot: int,
    b_min: int,
    singleton_affinity: dict[int, int] | None = None,
) -> BudgetPlan:
    """Distribute ``b_tot`` labels over ``clusters`` per Eqs. 4–9.

    ``singleton_affinity`` maps a singleton cluster id to the
    non-singleton cluster it should merge into if Eq. 4 forces merging
    (computed by the caller from graph similarities); without it,
    singletons merge into the largest non-singleton cluster.
    """
    if not clusters:
        return BudgetPlan(per_cluster={})
    clusters = [c for c in clusters if c.n_vectors > 0] or clusters
    merged: dict[int, int] = {}

    # Eq. 4: merge singletons into non-singletons while minima don't fit.
    work = {c.cid: ClusterInfo(c.cid, list(c.problem_ids), c.n_vectors) for c in clusters}
    if len(work) * b_min > b_tot:
        non_singletons = [c for c in work.values() if not c.is_singleton]
        singles = [c for c in work.values() if c.is_singleton]
        if non_singletons:
            default_host = max(non_singletons, key=lambda c: c.n_vectors).cid
            for s in singles:
                host = (singleton_affinity or {}).get(s.cid, default_host)
                if host not in work or work[host].is_singleton:
                    host = default_host
                work[host].problem_ids.extend(s.problem_ids)
                work[host].n_vectors += s.n_vectors
                merged[s.cid] = host
                del work[s.cid]

    # If minima still don't fit, lower b_min (budget must stay feasible).
    b_min_used = b_min
    if len(work) * b_min_used > b_tot:
        b_min_used = max(1, b_tot // len(work))

    b_rem = max(0, b_tot - b_min_used * len(work))  # Eq. 5
    ns = [c for c in work.values() if not c.is_singleton]
    s = [c for c in work.values() if c.is_singleton]
    n_problems = sum(len(c.problem_ids) for c in work.values())
    ratio_ns = sum(len(c.problem_ids) for c in ns) / n_problems  # Eq. 6
    ratio_s = sum(len(c.problem_ids) for c in s) / n_problems  # Eq. 7

    alloc: dict[int, float] = {c.cid: float(b_min_used) for c in work.values()}
    for group, ratio in ((ns, ratio_ns), (s, ratio_s)):
        tot = sum(c.n_vectors for c in group)
        if tot <= 0:
            continue
        for c in group:
            alloc[c.cid] += c.n_vectors / tot * b_rem * ratio  # Eq. 9

    # Integerise (floor, so the sum cannot overshoot b_tot), cap at
    # vector counts, then hand the remainder to clusters with room.
    plan = {cid: min(int(v), work[cid].n_vectors) for cid, v in alloc.items()}
    surplus = b_tot - sum(plan.values())
    if surplus > 0:
        # Hand leftover labels to clusters with remaining capacity,
        # largest capacity first (deterministic).
        for c in sorted(work.values(), key=lambda c: -(c.n_vectors - plan[c.cid])):
            room = c.n_vectors - plan[c.cid]
            give = min(room, surplus)
            plan[c.cid] += give
            surplus -= give
            if surplus <= 0:
                break
    return BudgetPlan(per_cluster=plan, merged_into=merged, b_min_used=b_min_used)


def retrain_budget(b_tot: int, coverage: float, n_prev_train: int) -> int:
    """Eq. 14: budget for updating a cluster model under ``sel_cov``.

    ``b_new = b_tot * cov(C) * (|T ∩ C_prev| / b_tot)``, which reduces
    to ``cov(C) * |T ∩ C_prev|``; at least 1 when coverage is positive.
    """
    b = int(round(coverage * n_prev_train))
    return max(1, b) if coverage > 0 else 0
