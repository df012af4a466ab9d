"""Unit tests for the DeepLog-style n-gram detector (detect.ngram)."""
import pytest

from repro.detect.ngram import BOS, EOS, NGramDetector

FLOW = ["open", "send", "send", "ack", "close"]


@pytest.fixture()
def trained():
    return NGramDetector(h=3, g=2).fit([FLOW] * 50)


def test_constructor_validation():
    with pytest.raises(ValueError):
        NGramDetector(h=0)
    with pytest.raises(ValueError):
        NGramDetector(g=0)


def test_normal_flow_not_flagged(trained):
    assert not trained.is_anomalous(FLOW)
    assert trained.score(FLOW) == 0.0


def test_unseen_event_flagged(trained):
    assert trained.is_anomalous(["open", "CRASH", "send", "ack", "close"])


def test_out_of_order_flagged(trained):
    assert trained.is_anomalous(["close", "open", "send", "send", "ack"])


def test_silent_truncation_flagged_via_eos(trained):
    assert trained.is_anomalous(["open", "send"])


def test_truncation_not_flagged_without_eos():
    d = NGramDetector(h=3, g=2, use_eos=False).fit([FLOW] * 50)
    assert not d.is_anomalous(["open", "send"])


def test_vocab_contains_events_and_eos(trained):
    assert set(FLOW) <= trained.vocab
    assert EOS in trained.vocab


def test_top_g_limits_candidates():
    seqs = [["a", x] for x in ["b", "c", "d", "e"]] * 10
    d = NGramDetector(h=1, g=2).fit(seqs)
    cands = d._top_g(("a",))
    assert len(cands) == 2


def test_top_g_unknown_context_none(trained):
    assert trained._top_g(("never-seen",)) is None


def test_backoff_to_shorter_history():
    # exact 3-history unseen but 1-history known -> backoff predicts
    d = NGramDetector(h=3, g=3).fit([["a", "b", "c", "d"]] * 5)
    cands = d._top_g(("zz", "zz", "c"))
    assert cands == ["d"]


def test_multiple_flows_learned():
    f1 = ["a", "b", "c"]
    f2 = ["x", "y", "z"]
    d = NGramDetector(h=2, g=3).fit([f1] * 20 + [f2] * 20)
    assert not d.is_anomalous(f1)
    assert not d.is_anomalous(f2)
    assert d.is_anomalous(["a", "y", "c"])


def test_window_flags_length(trained):
    flags = trained.window_flags(FLOW)
    assert len(flags) == len(FLOW) + 1  # + EOS position


def test_empty_sequence():
    d = NGramDetector(h=2, g=1, use_eos=False).fit([["a"]])
    assert d.score([]) == 0.0
    assert not d.is_anomalous([])


def test_predict_batches(trained):
    preds = trained.predict([FLOW, ["open", "BAD"]])
    assert preds == [0, 1]


def test_score_fraction(trained):
    bad = ["open", "BAD", "BAD"]
    s = trained.score(bad)
    assert 0 < s <= 1


def test_g_one_is_strictest():
    seqs = [["a", "b"], ["a", "c"]] * 10
    strict = NGramDetector(h=1, g=1).fit(seqs)
    loose = NGramDetector(h=1, g=2).fit(seqs)
    # with g=1 only the single most common continuation is allowed
    assert strict.is_anomalous(["a", "c"]) or strict.is_anomalous(["a", "b"])
    assert not loose.is_anomalous(["a", "b"])
    assert not loose.is_anomalous(["a", "c"])


def test_bos_constant_exported():
    assert BOS != EOS
