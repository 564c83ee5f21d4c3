"""One-hidden-layer MLP trained with minibatch SGD.

Stands in for the neural classifiers of the Ditto / Sudowoodo proxies:
epoch-style training over the full labeled set is what gives those
baselines their characteristic runtime cost in Fig. 6 / Table 4.
"""
import numpy as np

from repro.ml.logreg import _sigmoid


class MLP:
    """Binary classifier: ``sigmoid(W2 @ relu(W1 @ x + b1) + b2)``.

    Parameters
    ----------
    hidden : hidden-layer width.
    lr : SGD step size.
    epochs : passes over the training data (10 mirrors the paper's
        Ditto setup).
    batch_size : minibatch size.
    seed : init/shuffle RNG seed.
    """

    kind = "mlp"

    def __init__(
        self,
        hidden: int = 32,
        lr: float = 0.05,
        epochs: int = 10,
        batch_size: int = 64,
        seed: int = 0,
    ):
        self.hidden = hidden
        self.lr = lr
        self.epochs = epochs
        self.batch_size = batch_size
        self.seed = seed
        self.W1: np.ndarray | None = None
        self.b1: np.ndarray | None = None
        self.W2: np.ndarray | None = None
        self.b2: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MLP":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        n, d = X.shape
        rng = np.random.default_rng(self.seed)
        self.W1 = rng.normal(0, np.sqrt(2.0 / d), size=(d, self.hidden))
        self.b1 = np.zeros(self.hidden)
        self.W2 = rng.normal(0, np.sqrt(1.0 / self.hidden), size=self.hidden)
        self.b2 = 0.0
        for _ in range(self.epochs):
            order = rng.permutation(n)
            for start in range(0, n, self.batch_size):
                idx = order[start : start + self.batch_size]
                xb, yb = X[idx], y[idx]
                h_pre = xb @ self.W1 + self.b1
                h = np.maximum(h_pre, 0.0)
                p = _sigmoid(h @ self.W2 + self.b2)
                # Backprop of mean binary cross-entropy.
                dz2 = (p - yb) / idx.size
                gW2 = h.T @ dz2
                gb2 = dz2.sum()
                dh = np.outer(dz2, self.W2) * (h_pre > 0)
                gW1 = xb.T @ dh
                gb1 = dh.sum(axis=0)
                self.W2 -= self.lr * gW2
                self.b2 -= self.lr * gb2
                self.W1 -= self.lr * gW1
                self.b1 -= self.lr * gb1
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if self.W1 is None:
            raise RuntimeError("model is not fitted")
        X = np.asarray(X, dtype=np.float64)
        h = np.maximum(X @ self.W1 + self.b1, 0.0)
        return _sigmoid(h @ self.W2 + self.b2)

    def predict(self, X: np.ndarray, threshold: float = 0.5) -> np.ndarray:
        return (self.predict_proba(X) >= threshold).astype(np.int64)

    def to_dict(self) -> dict:
        return {
            "kind": self.kind,
            "hidden": self.hidden,
            "lr": self.lr,
            "epochs": self.epochs,
            "batch_size": self.batch_size,
            "seed": self.seed,
            "W1": self.W1.tolist(),
            "b1": self.b1.tolist(),
            "W2": self.W2.tolist(),
            "b2": self.b2,
        }

    @classmethod
    def from_dict(cls, d: dict) -> "MLP":
        m = cls(
            hidden=d["hidden"],
            lr=d["lr"],
            epochs=d["epochs"],
            batch_size=d["batch_size"],
            seed=d["seed"],
        )
        m.W1 = np.asarray(d["W1"], dtype=np.float64)
        m.b1 = np.asarray(d["b1"], dtype=np.float64)
        m.W2 = np.asarray(d["W2"], dtype=np.float64)
        m.b2 = float(d["b2"])
        return m
