"""Model <-> dict round-tripping.

Models cross the driver/executor boundary as plain dicts (broadcast into
``mapInPandas`` closures) and persist into the repository's JSON file,
so every classifier implements ``to_dict`` / ``from_dict`` and this
module dispatches on the ``kind`` tag.
"""
from __future__ import annotations

from typing import Any


def model_to_dict(model: Any) -> dict:
    """Serialise a fitted model to a plain JSON-safe dict."""
    return model.to_dict()


def model_from_dict(d: dict) -> Any:
    """Rebuild a model from :func:`model_to_dict` output."""
    # Imported lazily to avoid circular imports with repro.ml.__init__.
    from repro.ml.forest import RandomForest
    from repro.ml.logreg import LogisticRegression
    from repro.ml.mlp import MLP
    from repro.ml.tree import DecisionTree

    kinds = {
        "logreg": LogisticRegression,
        "tree": DecisionTree,
        "forest": RandomForest,
        "mlp": MLP,
    }
    kind = d.get("kind")
    if kind not in kinds:
        raise ValueError(f"unknown model kind: {kind!r}")
    return kinds[kind].from_dict(d)
