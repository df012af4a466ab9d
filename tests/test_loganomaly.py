"""Unit tests for the LogAnomaly-style detector (detect.loganomaly)."""
import pytest

from repro.detect.loganomaly import LogAnomalyDetector, TemplateMatcher, _jaccard

TEMPLATES = {
    "e.open": "Opening connection to <*>",
    "e.send": "Sending <*> bytes to <*>",
    "e.close": "Closing connection to <*>",
}
FLOW = ["e.open", "e.send", "e.send", "e.close"]


def test_jaccard():
    assert _jaccard("a b c", "a b c") == 1.0
    assert _jaccard("a b", "c d") == 0.0
    assert 0 < _jaccard("send bytes now", "send bytes later") < 1


def test_matcher_known_id_identity():
    m = TemplateMatcher().fit(TEMPLATES)
    assert m.match("e.open", None) == "e.open"


def test_matcher_maps_twisted_template():
    m = TemplateMatcher().fit(TEMPLATES)
    got = m.match("e.send~", "Dispatching <*> bytes to <*>")
    assert got == "e.send"


def test_matcher_rejects_unrelated():
    m = TemplateMatcher().fit(TEMPLATES)
    assert m.match("x", "totally different words entirely here") is None


def test_matcher_none_template_none():
    m = TemplateMatcher().fit(TEMPLATES)
    assert m.match("unknown", None) is None


def test_matcher_caches(monkeypatch):
    m = TemplateMatcher().fit(TEMPLATES)
    first = m.match("a", "Opening connection now <*>")
    monkeypatch.setattr(m, "_vecs", {})  # cache must short-circuit lookup
    assert m.match("a", "Opening connection now <*>") == first


@pytest.fixture()
def detector():
    return LogAnomalyDetector(h=2, g=2).fit([FLOW] * 50, TEMPLATES)


def test_normal_flow_passes(detector):
    assert not detector.is_anomalous(FLOW, TEMPLATES)


def test_unknown_unmatched_event_flagged(detector):
    seq = ["e.open", "e.crash", "e.close"]
    assert detector.is_anomalous(seq, {**TEMPLATES, "e.crash": "kernel panic badness"})


def test_twisted_event_remapped_not_flagged(detector):
    seq = ["e.open", "e.send~", "e.send", "e.close"]
    tmap = {**TEMPLATES, "e.send~": "Dispatching <*> bytes to <*>"}
    assert not detector.is_anomalous(seq, tmap)


def test_without_templates_twist_is_flagged(detector):
    # no template map -> no matching -> unseen id flags (DeepLog behaviour)
    seq = ["e.open", "e.send~", "e.send", "e.close"]
    assert detector.is_anomalous(seq, None)


def test_count_anomaly_flagged(detector):
    seq = ["e.open"] + ["e.send"] * 40 + ["e.close"]
    assert detector.is_anomalous(seq, TEMPLATES)


def test_predict_batch(detector):
    preds = detector.predict([FLOW, ["e.open", "e.close", "e.send"]], TEMPLATES)
    assert preds[0] == 0 and len(preds) == 2
