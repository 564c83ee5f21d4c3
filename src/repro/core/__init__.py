"""MoRER core: the paper's contribution.

Pipeline (Fig. 3): similarity distribution analysis -> ER problem
clustering -> per-cluster model generation (budgeted AL) -> model
repository -> selection (sel_base / sel_cov) -> classification.
"""
