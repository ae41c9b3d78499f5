"""Baselines of the paper's Table 3.

Unsupervised: naive GMM (MLlib), K-Means (MLlib = KM-SK, cluster-weighted =
KM-RL), Fellegi-Sunter ECM, PPJoin similarity join. Supervised: MLlib
LR/RF/MLP, DeepMatcher-lite (see DESIGN.md substitution), and uncertainty-
sampling active learning over random forests.
"""
