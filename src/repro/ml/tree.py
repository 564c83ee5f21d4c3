"""CART decision tree (gini impurity) on dense float features.

The workhorse classifier: bootstrap-committee member (Eq. 10 needs k
re-trained models, so fitting must be fast on small samples) and the
base learner of :class:`repro.ml.forest.RandomForest`.

The tree is stored as flat parallel arrays (feature, threshold, left,
right, value) so it serialises to a plain dict and predicts vectorised.
"""
import numpy as np


def _gini(counts: np.ndarray) -> float:
    n = counts.sum()
    if n == 0:
        return 0.0
    p = counts / n
    return float(1.0 - (p * p).sum())


class DecisionTree:
    """Binary CART classifier.

    Parameters
    ----------
    max_depth : maximum tree depth (root = depth 0).
    min_samples_leaf : do not create leaves smaller than this.
    max_features : number of features considered per split (None = all);
        randomised per split when set — used by the random forest.
    seed : RNG seed for the per-split feature subsample.
    """

    kind = "tree"

    def __init__(
        self,
        max_depth: int = 8,
        min_samples_leaf: int = 1,
        max_features: int | None = None,
        seed: int = 0,
    ):
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.max_features = max_features
        self.seed = seed
        # Flat node arrays; feature == -1 marks a leaf.
        self.feature: list[int] = []
        self.threshold: list[float] = []
        self.left: list[int] = []
        self.right: list[int] = []
        self.value: list[float] = []  # leaf P(match)

    # -- fitting -----------------------------------------------------------
    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTree":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.int64)
        self.feature, self.threshold = [], []
        self.left, self.right, self.value = [], [], []
        rng = np.random.default_rng(self.seed)
        self._build(X, y, depth=0, rng=rng)
        return self

    def _new_node(self) -> int:
        self.feature.append(-1)
        self.threshold.append(0.0)
        self.left.append(-1)
        self.right.append(-1)
        self.value.append(0.0)
        return len(self.feature) - 1

    def _best_split(
        self, X: np.ndarray, y: np.ndarray, rng: np.random.Generator
    ) -> tuple[int, float, float] | None:
        """Return (feature, threshold, impurity_decrease) or None."""
        n, d = X.shape
        feats = np.arange(d)
        if self.max_features is not None and self.max_features < d:
            feats = rng.choice(d, size=self.max_features, replace=False)
        parent_counts = np.bincount(y, minlength=2).astype(np.float64)
        parent_gini = _gini(parent_counts)
        best: tuple[int, float, float] | None = None
        msl = self.min_samples_leaf
        for f in feats:
            order = np.argsort(X[:, f], kind="stable")
            xs, ys = X[order, f], y[order]
            # Vectorised gain over every candidate split position i
            # (cut between sorted positions i and i+1).
            ones_prefix = np.cumsum(ys)
            total_ones = ones_prefix[-1]
            n_l = np.arange(1, n, dtype=np.float64)
            n_r = n - n_l
            valid = (xs[1:] > xs[:-1]) & (n_l >= msl) & (n_r >= msl)
            if not valid.any():
                continue
            ones_l = ones_prefix[:-1].astype(np.float64)
            ones_r = total_ones - ones_l
            gini_l = 1.0 - (ones_l / n_l) ** 2 - ((n_l - ones_l) / n_l) ** 2
            gini_r = 1.0 - (ones_r / n_r) ** 2 - ((n_r - ones_r) / n_r) ** 2
            gain = parent_gini - (n_l * gini_l + n_r * gini_r) / n
            gain[~valid] = -np.inf
            i = int(np.argmax(gain))
            if gain[i] > 1e-12 and (best is None or gain[i] > best[2]):
                thr = (xs[i] + xs[i + 1]) / 2.0
                best = (int(f), float(thr), float(gain[i]))
        return best

    def _build(
        self, X: np.ndarray, y: np.ndarray, depth: int, rng: np.random.Generator
    ) -> int:
        node = self._new_node()
        n = y.shape[0]
        self.value[node] = float(y.mean()) if n else 0.0
        if (
            depth >= self.max_depth
            or n < 2 * self.min_samples_leaf
            or y.min() == y.max()
        ):
            return node
        split = self._best_split(X, y, rng)
        if split is None:
            return node
        f, thr, _ = split
        mask = X[:, f] <= thr
        self.feature[node] = f
        self.threshold[node] = thr
        self.left[node] = self._build(X[mask], y[mask], depth + 1, rng)
        self.right[node] = self._build(X[~mask], y[~mask], depth + 1, rng)
        return node

    # -- prediction --------------------------------------------------------
    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if not self.feature:
            raise RuntimeError("model is not fitted")
        X = np.asarray(X, dtype=np.float64)
        feat = np.asarray(self.feature)
        thr = np.asarray(self.threshold)
        left = np.asarray(self.left)
        right = np.asarray(self.right)
        val = np.asarray(self.value)
        idx = np.zeros(X.shape[0], dtype=np.int64)
        active = feat[idx] >= 0
        while active.any():
            cur = idx[active]
            go_left = X[active, feat[cur]] <= thr[cur]
            nxt = np.where(go_left, left[cur], right[cur])
            idx[np.nonzero(active)[0]] = nxt
            active = feat[idx] >= 0
        return val[idx]

    def predict(self, X: np.ndarray, threshold: float = 0.5) -> np.ndarray:
        return (self.predict_proba(X) >= threshold).astype(np.int64)

    # -- serialisation -----------------------------------------------------
    def to_dict(self) -> dict:
        return {
            "kind": self.kind,
            "max_depth": self.max_depth,
            "min_samples_leaf": self.min_samples_leaf,
            "max_features": self.max_features,
            "seed": self.seed,
            "feature": list(self.feature),
            "threshold": list(self.threshold),
            "left": list(self.left),
            "right": list(self.right),
            "value": list(self.value),
        }

    @classmethod
    def from_dict(cls, d: dict) -> "DecisionTree":
        t = cls(
            max_depth=d["max_depth"],
            min_samples_leaf=d["min_samples_leaf"],
            max_features=d["max_features"],
            seed=d["seed"],
        )
        t.feature = list(d["feature"])
        t.threshold = list(d["threshold"])
        t.left = list(d["left"])
        t.right = list(d["right"])
        t.value = list(d["value"])
        return t
