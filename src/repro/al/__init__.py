"""Active-learning methods used for per-cluster model generation (§4.4).

Both methods operate on a driver-side pandas *pool* of one cluster's
similarity feature vectors (clusters are small by construction — the
whole point of MoRER's clustering is shrinking the AL search space) and
query a :class:`repro.al.oracle_labels.LabelOracle` that plays the
human annotator, backed by generator ground truth, with budget
accounting.
"""
from repro.al.oracle_labels import LabelOracle
from repro.al.bootstrap import bootstrap_al
from repro.al.almser import almser_al

__all__ = ["LabelOracle", "bootstrap_al", "almser_al"]
