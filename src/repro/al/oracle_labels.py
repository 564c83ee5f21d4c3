"""Label oracle: the simulated human annotator.

The generators carry ground-truth entity ids, so the oracle simply
reveals the ``label`` column — but only through :meth:`query`, which
counts every revealed label. All AL methods and the harness report
``oracle.spent`` so labeling effort is measured, not assumed.
"""
from __future__ import annotations

import numpy as np


class LabelOracle:
    """Budget-accounted access to ground-truth labels."""

    def __init__(self, budget: int | None = None):
        self.budget = budget
        self.spent = 0

    @property
    def remaining(self) -> int:
        return (self.budget - self.spent) if self.budget is not None else 2**31

    def query(self, labels: np.ndarray) -> np.ndarray:
        """Reveal ``labels`` (truncated to the remaining budget)."""
        labels = np.asarray(labels)
        take = min(len(labels), self.remaining)
        self.spent += take
        return labels[:take]
