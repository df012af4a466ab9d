"""Evaluation bookkeeping: the §III metrics and the simulated operators.

``prf`` implements the paper's §III Precision/Recall/F1 over session
labels. The admin-policy helpers define the ground truth the §V
classifier experiment (T7) is scored against: a deterministic mapping
from an anomaly report to the pool its resolution team would own and the
criticality an operator would assign — the "administrator's actions"
MoniLog passively learns from.
"""
from __future__ import annotations

import dataclasses
from typing import Sequence

import numpy as np

from repro.classify.pools import AnomalyReport


@dataclasses.dataclass(frozen=True)
class PRF:
    precision: float
    recall: float
    f1: float
    tp: int
    fp: int
    fn: int

    def row(self) -> dict:
        return {"precision": round(self.precision, 3),
                "recall": round(self.recall, 3), "f1": round(self.f1, 3)}


def prf(y_true: Sequence[int], y_pred: Sequence[int]) -> PRF:
    """Precision / recall / F1 exactly as defined in §III."""
    y = np.asarray(list(y_true), dtype=int)
    p = np.asarray(list(y_pred), dtype=int)
    if y.shape != p.shape:
        raise ValueError("label/prediction length mismatch")
    tp = int(((y == 1) & (p == 1)).sum())
    fp = int(((y == 0) & (p == 1)).sum())
    fn = int(((y == 1) & (p == 0)).sum())
    precision = tp / (tp + fp) if tp + fp else 0.0
    recall = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * precision * recall / (precision + recall) if precision + recall else 0.0
    return PRF(precision, recall, f1, tp, fp, fn)


# -- simulated operations teams (T7 ground truth) --------------------------

# Pools mirror how a Cloud operator divides responsibility (§V: "anomalies
# are generally not handled by the same team").
POOL_OF_SOURCE = {
    "net": "network", "api": "network",
    "hdfs": "storage", "sto": "storage", "db": "storage", "cache": "storage",
    "sch": "compute",
    "auth": "security",
}


def gt_pool(report: AnomalyReport) -> str:
    return POOL_OF_SOURCE.get(report.source, "compute")


def gt_criticality(report: AnomalyReport) -> str:
    """Operator policy: sequential anomalies that logged an ERROR are
    high; other sequential anomalies (silent truncations) moderate;
    quantitative anomalies low unless in the security pool."""
    if report.detector == "quant":
        return "moderate" if gt_pool(report) == "security" else "low"
    if "ERROR" in report.levels:
        return "high"
    return "moderate"
