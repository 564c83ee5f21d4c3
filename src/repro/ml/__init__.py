"""From-scratch NumPy ML substrate.

The paper uses scikit-learn 1.5.1 classifiers; sklearn is not available
offline, so the classifiers MoRER needs (committee members for the
Bootstrap/Almser AL methods, final per-cluster models, and the baseline
proxies' models) are implemented here on NumPy. All models share the
same minimal interface::

    model.fit(X, y)              # X: (n, d) float array, y: (n,) in {0, 1}
    model.predict_proba(X)       # (n,) P(match)
    model.predict(X)             # (n,) in {0, 1}

and round-trip through plain dicts (``repro.ml.serialize``) so they can
be broadcast into Spark pandas UDFs.
"""
from repro.ml.logreg import LogisticRegression
from repro.ml.tree import DecisionTree
from repro.ml.forest import RandomForest
from repro.ml.mlp import MLP
from repro.ml.serialize import model_from_dict, model_to_dict

__all__ = [
    "LogisticRegression",
    "DecisionTree",
    "RandomForest",
    "MLP",
    "model_to_dict",
    "model_from_dict",
]
