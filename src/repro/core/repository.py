"""The ER model repository (the paper's central artifact).

Holds, per cluster: the classifier (dict-serialised), the AL-selected
training vectors' distribution summary (``P_{C_i}``, what ``sel_base``
compares new problems against), the member problems, and bookkeeping
(budget, T/U problem sets). JSON persistence makes it an actual
*repository* — construct once, reload, solve new problems later.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field
from pathlib import Path

import numpy as np

from repro.core.distribution import ProblemSummary
from repro.graphcluster import Graph


@dataclass
class ClusterEntry:
    """One repository entry: a cluster of ER problems and its model.

    ``train_X``/``train_y`` are the AL-labeled vectors (P_{C_i} plus
    labels); sel_cov retraining concatenates fresh labels onto them.
    """

    cid: int
    problem_ids: list[str]
    model: dict  # serialised classifier
    train_summary: ProblemSummary  # distribution of P_{C_i}
    n_train: int
    budget_assigned: int
    train_X: np.ndarray = field(default_factory=lambda: np.zeros((0, 0)))
    train_y: np.ndarray = field(default_factory=lambda: np.zeros(0, dtype=np.int64))


@dataclass
class ModelRepository:
    """Model repository over solved ER problems."""

    test: str
    entries: dict[int, ClusterEntry] = field(default_factory=dict)
    partition: dict[str, int] = field(default_factory=dict)  # problem -> cid
    summaries: dict[str, ProblemSummary] = field(default_factory=dict)
    graph: Graph = field(default_factory=Graph)
    trained_problems: set[str] = field(default_factory=set)  # T (§4.5)
    labels_spent: int = 0

    @property
    def untrained_problems(self) -> set[str]:
        """U: problems known to the repository but unused for training."""
        return set(self.partition) - self.trained_problems

    def next_cid(self) -> int:
        return (max(self.entries) + 1) if self.entries else 0

    def model_for_problem(self, problem_id: str) -> dict | None:
        cid = self.partition.get(problem_id)
        return self.entries[cid].model if cid in self.entries else None

    # -- persistence -------------------------------------------------------
    def save(self, path: str | Path) -> None:
        """Persist to JSON (models are dicts; summaries -> lists)."""

        def summ(s: ProblemSummary) -> dict:
            return {
                "problem_id": s.problem_id,
                "hist": s.hist.tolist(),
                "std": s.std.tolist(),
                "n": s.n,
            }

        doc = {
            "test": self.test,
            "labels_spent": self.labels_spent,
            "trained_problems": sorted(self.trained_problems),
            "partition": self.partition,
            "entries": [
                {
                    "cid": e.cid,
                    "problem_ids": e.problem_ids,
                    "model": e.model,
                    "train_summary": summ(e.train_summary),
                    "n_train": e.n_train,
                    "budget_assigned": e.budget_assigned,
                    "train_X": e.train_X.tolist(),
                    "train_y": e.train_y.tolist(),
                }
                for e in self.entries.values()
            ],
            "edges": [[str(u), str(v), w] for u, v, w in self.graph.edges()],
            "summaries": {p: summ(s) for p, s in self.summaries.items()},
        }
        Path(path).write_text(json.dumps(doc))

    @classmethod
    def load(cls, path: str | Path) -> "ModelRepository":
        doc = json.loads(Path(path).read_text())

        def summ(d: dict) -> ProblemSummary:
            hist = np.asarray(d["hist"], dtype=np.float64)
            return ProblemSummary(
                problem_id=d["problem_id"],
                hist=hist,
                cdf=np.cumsum(hist, axis=1),
                std=np.asarray(d["std"], dtype=np.float64),
                n=int(d["n"]),
            )

        repo = cls(test=doc["test"])
        repo.labels_spent = int(doc["labels_spent"])
        repo.trained_problems = set(doc["trained_problems"])
        repo.partition = {k: int(v) for k, v in doc["partition"].items()}
        for e in doc["entries"]:
            repo.entries[int(e["cid"])] = ClusterEntry(
                cid=int(e["cid"]),
                problem_ids=list(e["problem_ids"]),
                model=e["model"],
                train_summary=summ(e["train_summary"]),
                n_train=int(e["n_train"]),
                budget_assigned=int(e["budget_assigned"]),
                train_X=np.asarray(e["train_X"], dtype=np.float64),
                train_y=np.asarray(e["train_y"], dtype=np.int64),
            )
        repo.summaries = {p: summ(s) for p, s in doc["summaries"].items()}
        for p in repo.partition:
            repo.graph.add_node(p)
        for u, v, w in doc["edges"]:
            repo.graph.add_edge(u, v, float(w))
        return repo
