"""Unit tests for the §V pool system (classify.pools)."""
import pytest

from repro.classify.pools import (CRITICALITY_LEVELS, DEFAULT_POOL,
                                  AnomalyReport, PoolSystem, make_report)


def _report(i=0, source="net"):
    return make_report(f"s{i}", source, ["e.a", "e.b"], ["INFO", "ERROR"], "seq")


def test_make_report_fields():
    r = _report()
    assert r.report_id == "r-s0"
    assert r.n_lines == 2
    assert r.detector == "seq"


def test_feature_tokens_cover_everything():
    toks = _report().feature_tokens()
    assert "ev:e.a" in toks and "ev:e.b" in toks
    assert "src:net" in toks and "det:seq" in toks
    assert "lvl:ERROR" in toks and "lvl:INFO" in toks


def test_initial_state_has_only_default_pool():
    ps = PoolSystem()
    assert ps.pools() == [DEFAULT_POOL]


def test_add_and_locate():
    ps = PoolSystem()
    r = _report()
    ps.add(r)
    assert ps.location(r.report_id) == DEFAULT_POOL
    assert ps.criticality(r.report_id) == "low"
    assert ps.reports_in(DEFAULT_POOL) == [r]


def test_add_validations():
    ps = PoolSystem()
    with pytest.raises(KeyError):
        ps.add(_report(), pool="nope")
    with pytest.raises(ValueError):
        ps.add(_report(), criticality="catastrophic")


def test_create_and_delete_pool():
    ps = PoolSystem()
    ps.create_pool("network")
    assert "network" in ps.pools()
    with pytest.raises(ValueError):
        ps.create_pool("network")
    r = _report()
    ps.add(r, pool="network")
    ps.delete_pool("network")
    # reports fall back into the default pool
    assert ps.location(r.report_id) == DEFAULT_POOL


def test_cannot_delete_default_pool():
    with pytest.raises(ValueError):
        PoolSystem().delete_pool(DEFAULT_POOL)


def test_move_records_action():
    ps = PoolSystem()
    ps.create_pool("storage")
    r = _report()
    ps.add(r)
    action = ps.move(r.report_id, "storage")
    assert ps.location(r.report_id) == "storage"
    assert action.kind == "move" and action.value == "storage"
    assert ps.actions == [action]


def test_move_to_unknown_pool_raises():
    ps = PoolSystem()
    r = _report()
    ps.add(r)
    with pytest.raises(KeyError):
        ps.move(r.report_id, "nope")


def test_set_criticality_records_action():
    ps = PoolSystem()
    r = _report()
    ps.add(r)
    action = ps.set_criticality(r.report_id, "high")
    assert ps.criticality(r.report_id) == "high"
    assert action.kind == "level" and action.value == "high"
    with pytest.raises(ValueError):
        ps.set_criticality(r.report_id, "mega")


def test_stats():
    ps = PoolSystem()
    ps.create_pool("a")
    ps.add(_report(1))
    ps.add(_report(2), pool="a")
    assert ps.stats() == {DEFAULT_POOL: 1, "a": 1}


def test_levels_constant():
    assert CRITICALITY_LEVELS == ("low", "moderate", "high")
