"""Unit tests for the source-profile catalogue (loggen.templates)."""
import numpy as np
import pytest

from repro.loggen import templates as T

ALL = T.profiles(8)


def test_profiles_count_bounds():
    assert len(T.profiles(1)) == 1
    assert len(T.profiles(8)) == 8
    with pytest.raises(ValueError):
        T.profiles(0)
    with pytest.raises(ValueError):
        T.profiles(9)


def test_profiles_first_is_hdfs():
    assert T.profiles(1)[0].name == "hdfs"


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_profile_tids_unique_and_prefixed(profile):
    tids = [t.tid for t in profile.templates]
    assert len(set(tids)) == len(tids)
    assert all(t.startswith(profile.name + ".") for t in tids)


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_profile_flows_reference_known_templates(profile):
    known = {t.tid for t in profile.templates}
    for flow in profile.normal_flows:
        for tid, rep in flow:
            assert tid in known
            assert rep >= 1


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_error_tids_never_in_normal_flows(profile):
    flow_tids = {tid for flow in profile.normal_flows for tid, _ in flow}
    assert not flow_tids & set(profile.error_tids)
    known = {t.tid for t in profile.templates}
    assert set(profile.error_tids) <= known


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_slot_count_matches_wildcards(profile):
    for tpl in profile.templates:
        assert tpl.text.count("<*>") == tpl.n_slots()


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_quant_slots_are_numeric_kinds(profile):
    for tpl in profile.templates:
        if tpl.quant_slot is not None:
            assert tpl.slots[tpl.quant_slot] in ("size", "num")


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_every_profile_has_a_quant_eligible_flow(profile):
    # quantitative anomalies need at least one numeric slot in some flow
    flow_tids = {tid for flow in profile.normal_flows for tid, _ in flow}
    assert any(profile.template(t).quant_slot is not None for t in flow_tids)


@pytest.mark.parametrize("kind", T.SLOT_KINDS)
def test_sample_value_returns_string(kind):
    g = np.random.default_rng(0)
    v = T.sample_value(kind, g)
    assert isinstance(v, str) and v


def test_sample_value_unknown_kind_raises():
    with pytest.raises(ValueError):
        T.sample_value("nope", np.random.default_rng(0))


@pytest.mark.parametrize("kind", ["size", "num"])
def test_quant_anomaly_values_exceed_normal_range(kind):
    g = np.random.default_rng(1)
    normal_max = max(int(T.sample_value(kind, g)) for _ in range(500))
    g2 = np.random.default_rng(2)
    anom_min = min(int(T.sample_value(kind, g2, quant_anomaly=True)) for _ in range(200))
    assert anom_min > normal_max


def test_render_fills_slots_in_order():
    tpl = T.Template("x.0", "a <*> b <*>", ("num", "num"))
    assert T.render(tpl, ["1", "2"]) == "a 1 b 2"


def test_render_wrong_arity_raises():
    tpl = T.Template("x.0", "a <*>", ("num",))
    with pytest.raises(ValueError):
        T.render(tpl, ["1", "2"])


def test_render_appends_json_tail_in_paper_format():
    tpl = T.Template("x.0", "send <*>", ("num",), json_tail=("user_id", "route"))
    g = np.random.default_rng(3)
    msg = T.render(tpl, ["5"], g)
    assert msg.startswith("send 5 {")
    assert msg.endswith("}")
    assert "user_id=" in msg and "route=" in msg


def test_render_json_tail_deterministic_without_rng():
    tpl = T.Template("x.0", "send <*>", ("num",), json_tail=("user_id",))
    assert T.render(tpl, ["5"]) == T.render(tpl, ["5"])


@pytest.mark.parametrize("profile", ALL, ids=[p.name for p in ALL])
def test_template_lookup_roundtrip(profile):
    for tpl in profile.templates:
        assert profile.template(tpl.tid) is tpl
