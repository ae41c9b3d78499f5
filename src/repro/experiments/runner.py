"""Method registry shared by the Table 3/4/5 harnesses.

Every method consumes the same :class:`repro.core.zeroer.FeaturizedTask`
(same blocking, same Magellan-style features — the paper's protocol) except
PP* (its own concatenated-token join) and DM (its own richer representation).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro.baselines import active_learning, deepmatcher_lite, ecm, gmm_naive, kmeans, ppjoin, supervised
from repro.core.zeroer import FeaturizedTask, run_zeroer
from repro.eval import PRF, evaluate

UNSUPERVISED = ["ZeroER", "ECM", "KM-RL", "KM-SK", "GMM", "PP*"]
SUPERVISED = ["RF", "LR", "MLP", "DM"]
ACTIVE = ["AL-RF"]
ALL_METHODS = UNSUPERVISED + SUPERVISED + ACTIVE


@dataclass
class MethodResult:
    """F1 (plus components) of one method on one dataset."""

    dataset: str
    method: str
    f1: float
    precision: float
    recall: float
    extra: dict | None = None

    @classmethod
    def from_prf(cls, dataset: str, method: str, prf: PRF, extra: dict | None = None):
        return cls(dataset, method, prf.f1, prf.precision, prf.recall, extra)


def run_method(
    spark: SparkSession, task: FeaturizedTask, method: str, *, seed: int = 0
) -> MethodResult:
    """Run one Table 3 method on a featurized dataset and score it."""
    ds = task.ds
    truth = ds.matches
    if method == "ZeroER":
        res = run_zeroer(spark, task, transitivity="constraint")
        prf = evaluate(res.predictions, truth)
        return MethodResult.from_prf(ds.code, method, prf, {"iters": res.n_iterations})
    if method == "ECM":
        return MethodResult.from_prf(
            ds.code, method, evaluate(ecm.ecm(spark, task.cross, task.cols), truth)
        )
    if method == "KM-RL":
        return MethodResult.from_prf(
            ds.code, method, evaluate(kmeans.km_rl(spark, task.cross, task.cols), truth)
        )
    if method == "KM-SK":
        return MethodResult.from_prf(
            ds.code, method, evaluate(kmeans.km_sk(task.cross, task.cols, seed=seed), truth)
        )
    if method == "GMM":
        return MethodResult.from_prf(
            ds.code, method, evaluate(gmm_naive.gmm_naive(task.cross, task.cols, seed=seed), truth)
        )
    if method == "PP*":
        best, sweep = ppjoin.pp_star(ds)
        return MethodResult.from_prf(ds.code, method, best, {"sweep": sweep.to_dict("records")})
    if method in ("RF", "LR", "MLP"):
        run = supervised.supervised_f1(method, task.cross, task.cols, truth, seed=seed)
        return MethodResult.from_prf(ds.code, method, run.prf, {"n_train": run.n_train})
    if method == "DM":
        pairs = task.cross.select("l_id", "r_id")
        run = deepmatcher_lite.dm_lite_f1(spark, pairs, ds, seed=seed)
        return MethodResult.from_prf(ds.code, method, run.prf, {"n_train": run.n_train})
    if method == "AL-RF":
        res = active_learning.al_rf(spark, task.cross, task.cols, truth, seed=seed)
        return MethodResult.from_prf(
            ds.code, method, res.prf, {"n_labeled": res.n_labeled, "trajectory": res.trajectory}
        )
    raise ValueError(f"unknown method {method!r}")
