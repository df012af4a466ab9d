"""Source profiles: per-source log templates and execution-flow graphs.

MoniLog's evaluation environment (3DS OUTSCALE's multi-source Cloud log
stream) is proprietary, so this module is the simulation substrate: each
:class:`SourceProfile` models one software component with

* a catalogue of :class:`Template` objects (static text with ``<*>``
  slots and typed value generators, mirroring Fig. 2 of the paper),
* one or more *normal execution flows* (the "fixed flow" of §III along
  which logs are produced),
* designated *sequential-anomaly* mutations (deviations from the flow,
  e.g. ``L1 -> L4`` in Table I) and *quantitative-anomaly* slots
  (normal flow, out-of-range value, e.g. ``L3``).

Eight profiles are provided so multi-source experiments (T3) can
interleave genuinely distinct flows; ``hdfs_lite()`` mirrors the HDFS
block lifecycle used by the cited DeepLog/LogRobust evaluations so the
session semantics of those protocols carry over.
"""
from __future__ import annotations

import dataclasses
from typing import Callable, Sequence

import numpy as np

# Slot kinds understood by the value sampler. "size"/"num" are numeric and
# eligible for quantitative-anomaly injection; the rest are categorical.
SLOT_KINDS = ("size", "num", "ip", "host", "user", "vol", "port")


@dataclasses.dataclass(frozen=True)
class Template:
    """One log statement: static tokens with ``<*>`` variable slots.

    ``tid`` is globally unique across profiles (``<source>.<n>``); the
    detectors use it as the ground-truth event id. ``slots`` names the
    kind of each ``<*>`` in order. ``level`` fills the log HEADER.
    ``quant_slot`` marks which slot (index) carries the value that a
    quantitative anomaly perturbs; None means not eligible.
    """

    tid: str
    text: str
    slots: tuple[str, ...]
    level: str = "INFO"
    quant_slot: int | None = None
    json_tail: tuple[str, ...] = ()  # keys of a JSON suffix, empty = none

    def n_slots(self) -> int:
        return len(self.slots)


@dataclasses.dataclass(frozen=True)
class SourceProfile:
    """A software component: templates + normal flows + anomaly modes."""

    name: str
    templates: tuple[Template, ...]
    # Each flow is a sequence of (tid, repeat) steps executed in order.
    normal_flows: tuple[tuple[tuple[str, int], ...], ...]
    # Error templates inserted by sequential anomalies (never in flows).
    error_tids: tuple[str, ...]

    def template(self, tid: str) -> Template:
        return self._by_id()[tid]

    def _by_id(self) -> dict[str, Template]:
        return {t.tid: t for t in self.templates}


def _t(source: str, n: int, text: str, slots: Sequence[str], **kw) -> Template:
    return Template(tid=f"{source}.{n}", text=text, slots=tuple(slots), **kw)


def hdfs_lite() -> SourceProfile:
    """HDFS-like block lifecycle (the cited works' evaluation workload)."""
    s = "hdfs"
    templates = (
        _t(s, 0, "Allocating block <*> size <*>", ["num", "size"], quant_slot=1),
        _t(s, 1, "Receiving block <*> src: /<*> dest: /<*>", ["num", "ip", "ip"]),
        _t(s, 2, "Received block <*> of size <*> from /<*>", ["num", "size", "ip"], quant_slot=1),
        _t(s, 3, "PacketResponder <*> for block <*> terminating", ["num", "num"]),
        _t(s, 4, "BLOCK NameSystem addStoredBlock blockMap updated <*> is added to <*> size <*>", ["ip", "num", "size"], quant_slot=2),
        _t(s, 5, "Verification succeeded for block <*>", ["num"]),
        _t(s, 6, "Deleting block <*> file /data/<*>", ["num", "num"]),
        _t(s, 7, "Exception in receiveBlock for block <*> java.io.IOException", ["num"], level="ERROR"),
        _t(s, 8, "Failed to verify data integrity for block <*>", ["num"], level="ERROR"),
    )
    flows = (
        # allocate -> 3x(receive, received, responder, addStored) -> verify
        (("hdfs.0", 1), ("hdfs.1", 3), ("hdfs.2", 3), ("hdfs.3", 3), ("hdfs.4", 3), ("hdfs.5", 1)),
        # shorter 2-replica flow without verification
        (("hdfs.0", 1), ("hdfs.1", 2), ("hdfs.2", 2), ("hdfs.3", 2), ("hdfs.4", 2)),
    )
    return SourceProfile(s, templates, flows, error_tids=("hdfs.7", "hdfs.8"))


def network() -> SourceProfile:
    s = "net"
    templates = (
        _t(s, 0, "Opening connection to <*>:<*>", ["ip", "port"]),
        _t(s, 1, "Sending <*> bytes src: <*> dest: /<*>", ["size", "ip", "ip"], quant_slot=0),
        _t(s, 2, "Ack received from /<*> after <*> ms", ["ip", "num"], quant_slot=1),
        _t(s, 3, "Closing connection to <*>:<*>", ["ip", "port"]),
        _t(s, 4, "Error while receiving data src: <*> dest: /<*>", ["ip", "ip"], level="ERROR"),
        _t(s, 5, "Failed to verify data integrity src: <*> dest: /<*>", ["ip", "ip"], level="ERROR"),
        _t(s, 6, "Retransmitting packet <*> to /<*>", ["num", "ip"], level="WARN"),
    )
    flows = (
        (("net.0", 1), ("net.1", 4), ("net.2", 4), ("net.3", 1)),
        (("net.0", 1), ("net.1", 2), ("net.2", 2), ("net.3", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("net.4", "net.5", "net.6"))


def storage() -> SourceProfile:
    s = "sto"
    templates = (
        _t(s, 0, "Attaching volume <*> to instance <*>", ["vol", "host"]),
        _t(s, 1, "Volume <*> write <*> blocks latency <*> ms", ["vol", "size", "num"], quant_slot=1),
        _t(s, 2, "Snapshot of volume <*> completed in <*> s", ["vol", "num"], quant_slot=1),
        _t(s, 3, "Detaching volume <*> from instance <*>", ["vol", "host"]),
        _t(s, 4, "I/O error on volume <*> sector <*>", ["vol", "num"], level="ERROR"),
        _t(s, 5, "Volume <*> is degraded replica count <*>", ["vol", "num"], level="WARN"),
    )
    flows = (
        (("sto.0", 1), ("sto.1", 3), ("sto.2", 1), ("sto.3", 1)),
        (("sto.0", 1), ("sto.1", 5), ("sto.3", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("sto.4", "sto.5"))


def scheduler() -> SourceProfile:
    s = "sch"
    templates = (
        _t(s, 0, "New process started: process <*> started on port <*>", ["host", "port"]),
        _t(s, 1, "Scheduling task <*> on worker <*>", ["num", "host"]),
        _t(s, 2, "Task <*> finished in <*> ms", ["num", "num"], quant_slot=1),
        _t(s, 3, "Worker <*> heartbeat ok load <*>", ["host", "num"], quant_slot=1),
        _t(s, 4, "Task <*> failed on worker <*> reason timeout", ["num", "host"], level="ERROR"),
        _t(s, 5, "Worker <*> missed heartbeat deadline", ["host"], level="WARN"),
    )
    flows = (
        (("sch.0", 1), ("sch.1", 3), ("sch.2", 3), ("sch.3", 1)),
        (("sch.1", 2), ("sch.2", 2), ("sch.3", 2)),
    )
    return SourceProfile(s, templates, flows, error_tids=("sch.4", "sch.5"))


def api_gateway() -> SourceProfile:
    """API-style service whose messages end with JSON data (§IV)."""
    s = "api"
    templates = (
        _t(s, 0, "Authenticated request from <*>", ["ip"],
           json_tail=("user_id", "service_name", "tenant_id", "region", "request_id", "api_version")),
        _t(s, 1, "Send <*> bytes to <*>", ["size", "ip"], quant_slot=0,
           json_tail=("user_id", "service_name", "request_id", "route", "zone", "proto")),
        _t(s, 2, "Request completed status <*> in <*> ms", ["num", "num"], quant_slot=1,
           json_tail=("user_id", "route", "request_id", "tenant_id", "backend", "cache")),
        _t(s, 3, "Rate limit exceeded for <*>", ["ip"], level="WARN",
           json_tail=("user_id", "route", "request_id", "limit_id")),
        _t(s, 4, "Upstream <*> returned error status <*>", ["host", "num"], level="ERROR",
           json_tail=("route", "request_id", "backend", "tenant_id")),
    )
    flows = (
        (("api.0", 1), ("api.1", 2), ("api.2", 2)),
        (("api.0", 1), ("api.2", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("api.3", "api.4"))


def auth() -> SourceProfile:
    s = "auth"
    templates = (
        _t(s, 0, "Login attempt for user <*> from <*>", ["user", "ip"]),
        _t(s, 1, "Session token issued to user <*> ttl <*> s", ["user", "num"], quant_slot=1),
        _t(s, 2, "Session for user <*> refreshed", ["user"]),
        _t(s, 3, "User <*> logged out", ["user"]),
        _t(s, 4, "Invalid credentials for user <*> from <*>", ["user", "ip"], level="WARN"),
        _t(s, 5, "Account <*> locked after repeated failures", ["user"], level="ERROR"),
    )
    flows = (
        (("auth.0", 1), ("auth.1", 1), ("auth.2", 2), ("auth.3", 1)),
        (("auth.0", 1), ("auth.1", 1), ("auth.3", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("auth.4", "auth.5"))


def database() -> SourceProfile:
    s = "db"
    templates = (
        _t(s, 0, "Transaction <*> begin on shard <*>", ["num", "num"]),
        _t(s, 1, "Query executed rows <*> time <*> ms", ["size", "num"], quant_slot=0),
        _t(s, 2, "Transaction <*> commit ok", ["num"]),
        _t(s, 3, "Checkpoint completed wal size <*> MB", ["size"], quant_slot=0),
        _t(s, 4, "Transaction <*> aborted deadlock detected", ["num"], level="ERROR"),
        _t(s, 5, "Replication lag on shard <*> is <*> s", ["num", "num"], level="WARN"),
    )
    flows = (
        (("db.0", 1), ("db.1", 3), ("db.2", 1)),
        (("db.0", 1), ("db.1", 1), ("db.2", 1), ("db.3", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("db.4", "db.5"))


def cache() -> SourceProfile:
    s = "cache"
    templates = (
        _t(s, 0, "Cache node <*> joined ring", ["host"]),
        _t(s, 1, "Evicted <*> keys from node <*>", ["size", "host"], quant_slot=0),
        _t(s, 2, "Rebalance moved <*> slots to node <*>", ["num", "host"]),
        _t(s, 3, "Node <*> left ring gracefully", ["host"]),
        _t(s, 4, "Node <*> unreachable marking down", ["host"], level="ERROR"),
        _t(s, 5, "Hot key detected <*> qps <*>", ["num", "num"], level="WARN"),
    )
    flows = (
        (("cache.0", 1), ("cache.1", 2), ("cache.2", 1), ("cache.3", 1)),
        (("cache.0", 1), ("cache.2", 2), ("cache.3", 1)),
    )
    return SourceProfile(s, templates, flows, error_tids=("cache.4", "cache.5"))


ALL_PROFILES: tuple[Callable[[], SourceProfile], ...] = (
    hdfs_lite, network, storage, scheduler, api_gateway, auth, database, cache,
)


def profiles(k: int = 8) -> list[SourceProfile]:
    """First ``k`` source profiles (k=1 -> HDFS-lite only)."""
    if not 1 <= k <= len(ALL_PROFILES):
        raise ValueError(f"k must be in [1, {len(ALL_PROFILES)}]")
    return [f() for f in ALL_PROFILES[:k]]


_WORDS = ("alpha", "bravo", "carol", "delta", "echo", "astro", "dart_vader",
          "vega", "orion", "lyra", "nadir", "zen", "quark", "mango")


def sample_value(kind: str, g: np.random.Generator, *, quant_anomaly: bool = False) -> str:
    """Draw a slot value. Numeric kinds have a tight normal range so that a
    quantitative anomaly (x100 the range, cf. L3 of Table I) is separable."""
    if kind == "size":
        if quant_anomaly:
            # log-uniform over ~4.5 decades starting just above the normal
            # range, so some anomalies are borderline (recall < 1 is real)
            return str(int(10 ** g.uniform(4.2, 8.7)))
        return str(int(g.integers(64, 9000)))
    if kind == "num":
        if quant_anomaly:
            return str(int(10 ** g.uniform(3.0, 6.5)))
        return str(int(g.integers(1, 500)))
    if kind == "ip":
        return f"10.250.{g.integers(0, 32)}.{g.integers(1, 255)}"
    if kind == "host":
        return f"{g.choice(_WORDS)}-{g.integers(1, 99)}"
    if kind == "user":
        return f"{g.choice(_WORDS)}{g.integers(1, 999)}"
    if kind == "vol":
        return f"vol-{g.integers(10_000, 99_999)}"
    if kind == "port":
        return str(int(g.integers(1024, 65535)))
    raise ValueError(f"unknown slot kind: {kind}")


def render(template: Template, values: Sequence[str], g: np.random.Generator | None = None) -> str:
    """Fill a template's ``<*>`` slots with ``values``; append the JSON
    tail (the §IV API-style suffix) when the template declares one."""
    if len(values) != template.n_slots():
        raise ValueError(f"{template.tid}: expected {template.n_slots()} values, got {len(values)}")
    msg = template.text
    for v in values:
        msg = msg.replace("<*>", str(v), 1)
    if template.json_tail:
        gg = g if g is not None else np.random.default_rng(len(msg))
        pairs = ", ".join(
            f"{k}={int(gg.integers(1, 10_000))}" if k.endswith("_id")
            else f"{k}={_WORDS[int(gg.integers(0, len(_WORDS)))]}"
            for k in template.json_tail
        )
        # The paper's §IV example format: "... {user_id=125, service_name=dart_vader}"
        msg = f"{msg} {{{pairs}}}"
    return msg
