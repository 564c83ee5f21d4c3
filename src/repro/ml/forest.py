"""Bagged random forest over :class:`repro.ml.tree.DecisionTree`.

The per-cluster repository models and the Almser committee use this —
the paper's reference implementation trains scikit-learn random forests.
"""
import numpy as np

from repro.ml.tree import DecisionTree


class RandomForest:
    """Random forest: bootstrap-sampled CART trees, sqrt(d) features/split.

    Parameters
    ----------
    n_estimators : number of trees.
    max_depth, min_samples_leaf : passed to each tree.
    seed : RNG seed; tree ``i`` gets ``seed + i`` so the ensemble is
        deterministic but diverse.
    """

    kind = "forest"

    def __init__(
        self,
        n_estimators: int = 20,
        max_depth: int = 8,
        min_samples_leaf: int = 1,
        seed: int = 0,
    ):
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.seed = seed
        self.trees: list[DecisionTree] = []

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.int64)
        n, d = X.shape
        max_features = max(1, int(np.sqrt(d)))
        rng = np.random.default_rng(self.seed)
        self.trees = []
        for i in range(self.n_estimators):
            idx = rng.integers(0, n, size=n)
            t = DecisionTree(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                max_features=max_features,
                seed=self.seed + i,
            )
            t.fit(X[idx], y[idx])
            self.trees.append(t)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if not self.trees:
            raise RuntimeError("model is not fitted")
        X = np.asarray(X, dtype=np.float64)
        return np.mean([t.predict_proba(X) for t in self.trees], axis=0)

    def predict(self, X: np.ndarray, threshold: float = 0.5) -> np.ndarray:
        return (self.predict_proba(X) >= threshold).astype(np.int64)

    def to_dict(self) -> dict:
        return {
            "kind": self.kind,
            "n_estimators": self.n_estimators,
            "max_depth": self.max_depth,
            "min_samples_leaf": self.min_samples_leaf,
            "seed": self.seed,
            "trees": [t.to_dict() for t in self.trees],
        }

    @classmethod
    def from_dict(cls, d: dict) -> "RandomForest":
        f = cls(
            n_estimators=d["n_estimators"],
            max_depth=d["max_depth"],
            min_samples_leaf=d["min_samples_leaf"],
            seed=d["seed"],
        )
        f.trees = [DecisionTree.from_dict(t) for t in d["trees"]]
        return f
