"""Named ZeroER ablation variants for the Table 5 harness.

Each variant swaps exactly one innovation for its "existing approach"
counterpart, per the paper's ablation columns: covariance structure
(group+share-corr → diag+share-cov), regularization (adaptive → uniform,
sklearn's default constant), transitivity (posterior constraints →
duplicate-free post-processing).
"""
from __future__ import annotations

from repro.core.em import EMConfig

VARIANTS: dict[str, dict] = {
    "ZeroER": {"config": EMConfig(), "transitivity": "constraint"},
    "diag+share cov": {
        "config": EMConfig(covariance="diag_shared_cov"),
        "transitivity": "constraint",
    },
    "uniform reg": {
        "config": EMConfig(regularization="uniform"),
        "transitivity": "constraint",
    },
    "post-processing": {"config": EMConfig(), "transitivity": "post"},
}
