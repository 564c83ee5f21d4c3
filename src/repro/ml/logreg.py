"""Binary logistic regression trained with full-batch gradient descent.

Used as a cheap committee member and by the AnyMatch proxy. L2
regularisation keeps weights bounded on separable similarity features.
"""
import numpy as np


def _sigmoid(z: np.ndarray) -> np.ndarray:
    # Clip to keep exp() finite; beyond ±30 sigmoid saturates anyway.
    return 1.0 / (1.0 + np.exp(-np.clip(z, -30.0, 30.0)))


class LogisticRegression:
    """Binary logistic regression on dense features.

    Parameters
    ----------
    lr : gradient-descent step size.
    n_iter : number of full-batch iterations.
    l2 : L2 penalty on the non-bias weights.
    """

    kind = "logreg"

    def __init__(self, lr: float = 0.5, n_iter: int = 200, l2: float = 1e-3):
        self.lr = lr
        self.n_iter = n_iter
        self.l2 = l2
        self.w: np.ndarray | None = None  # (d,) weights
        self.b: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegression":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        n, d = X.shape
        self.w = np.zeros(d)
        self.b = 0.0
        for _ in range(self.n_iter):
            p = _sigmoid(X @ self.w + self.b)
            err = p - y
            grad_w = X.T @ err / n + self.l2 * self.w
            grad_b = float(err.mean())
            self.w -= self.lr * grad_w
            self.b -= self.lr * grad_b
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if self.w is None:
            raise RuntimeError("model is not fitted")
        X = np.asarray(X, dtype=np.float64)
        return _sigmoid(X @ self.w + self.b)

    def predict(self, X: np.ndarray, threshold: float = 0.5) -> np.ndarray:
        return (self.predict_proba(X) >= threshold).astype(np.int64)

    def to_dict(self) -> dict:
        return {
            "kind": self.kind,
            "w": self.w.tolist(),
            "b": self.b,
            "lr": self.lr,
            "n_iter": self.n_iter,
            "l2": self.l2,
        }

    @classmethod
    def from_dict(cls, d: dict) -> "LogisticRegression":
        m = cls(lr=d["lr"], n_iter=d["n_iter"], l2=d["l2"])
        m.w = np.asarray(d["w"], dtype=np.float64)
        m.b = float(d["b"])
        return m
