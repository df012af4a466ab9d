"""Anomaly reports and the §V pool system.

MoniLog's detection stage emits *anomaly reports* — "composed of all the
logs linked to the identified anomalous sequence" (§II). The §V design
routes each report into a *pool* (a team's work queue) with a criticality
level; administrators may move reports between pools or edit levels, and
every such action is an assessment signal that passively trains the
classifier (see :mod:`repro.classify.classifier`).
"""
from __future__ import annotations

import dataclasses
from collections import Counter
from typing import Sequence

CRITICALITY_LEVELS = ("low", "moderate", "high")
DEFAULT_POOL = "default"


@dataclasses.dataclass(frozen=True)
class AnomalyReport:
    """One detected anomalous sequence with its linked logs."""

    report_id: str
    session_id: str
    source: str
    events: tuple[str, ...]          # event ids of the linked logs
    levels: tuple[str, ...]          # log HEADER levels of the linked logs
    detector: str                    # which detector raised ("seq"/"quant"/...)
    n_lines: int

    def feature_tokens(self) -> list[str]:
        """Token bag for the classifier: event ids, source, detector,
        and the header-level histogram."""
        toks = [f"ev:{e}" for e in self.events]
        toks.append(f"src:{self.source}")
        toks.append(f"det:{self.detector}")
        toks.extend(f"lvl:{lv}" for lv in self.levels)
        return toks


def make_report(session_id: str, source: str, events: Sequence[str],
                levels: Sequence[str], detector: str) -> AnomalyReport:
    return AnomalyReport(
        report_id=f"r-{session_id}",
        session_id=session_id,
        source=source,
        events=tuple(events),
        levels=tuple(levels),
        detector=detector,
        n_lines=len(events),
    )


@dataclasses.dataclass
class PoolAction:
    """One administrator action — the passive supervision signal."""

    report_id: str
    kind: str          # "move" or "level"
    value: str         # target pool / target criticality


class PoolSystem:
    """Named pools holding reports; admin actions produce training signals.

    Initially only the default pool exists (§V); administrators create or
    delete pools and move reports. ``route`` places a new report by the
    classifier's prediction (default pool before any training).
    """

    def __init__(self) -> None:
        self._pools: dict[str, dict[str, AnomalyReport]] = {DEFAULT_POOL: {}}
        self._location: dict[str, str] = {}
        self._criticality: dict[str, str] = {}
        self.actions: list[PoolAction] = []

    # -- admin surface ----------------------------------------------------
    def create_pool(self, name: str) -> None:
        if name in self._pools:
            raise ValueError(f"pool {name!r} already exists")
        self._pools[name] = {}

    def delete_pool(self, name: str) -> None:
        if name == DEFAULT_POOL:
            raise ValueError("cannot delete the default pool")
        for report in list(self._pools.pop(name).values()):
            self._pools[DEFAULT_POOL][report.report_id] = report
            self._location[report.report_id] = DEFAULT_POOL

    def pools(self) -> list[str]:
        return list(self._pools)

    def reports_in(self, pool: str) -> list[AnomalyReport]:
        return list(self._pools[pool].values())

    # -- report lifecycle -------------------------------------------------
    def add(self, report: AnomalyReport, pool: str = DEFAULT_POOL,
            criticality: str = "low") -> None:
        if pool not in self._pools:
            raise KeyError(f"unknown pool {pool!r}")
        if criticality not in CRITICALITY_LEVELS:
            raise ValueError(f"unknown criticality {criticality!r}")
        self._pools[pool][report.report_id] = report
        self._location[report.report_id] = pool
        self._criticality[report.report_id] = criticality

    def location(self, report_id: str) -> str:
        return self._location[report_id]

    def criticality(self, report_id: str) -> str:
        return self._criticality[report_id]

    def move(self, report_id: str, to_pool: str) -> PoolAction:
        """Admin moves a report — recorded as an assessment signal (§V:
        'Each time an alert is moved from a pool to another, it is used
        as an assessment signal')."""
        if to_pool not in self._pools:
            raise KeyError(f"unknown pool {to_pool!r}")
        src = self._location[report_id]
        report = self._pools[src].pop(report_id)
        self._pools[to_pool][report_id] = report
        self._location[report_id] = to_pool
        action = PoolAction(report_id, "move", to_pool)
        self.actions.append(action)
        return action

    def set_criticality(self, report_id: str, level: str) -> PoolAction:
        """Admin edits a criticality level — likewise a training signal."""
        if level not in CRITICALITY_LEVELS:
            raise ValueError(f"unknown criticality {level!r}")
        self._criticality[report_id] = level
        action = PoolAction(report_id, "level", level)
        self.actions.append(action)
        return action

    def stats(self) -> Counter:
        return Counter({p: len(r) for p, r in self._pools.items()})
