"""Unit tests for the LogRobust-style semantic detector (detect.semantic)."""
import numpy as np
import pytest

from repro.detect.semantic import (SemanticDetector, SemanticVectorizer,
                                   _subtokens, token_vector)


@pytest.mark.parametrize("token,expect", [
    ("PacketResponder", ["packet", "responder"]),
    ("receiveBlock", ["receive", "block"]),
    ("src:", ["src"]),
    ("<*>", []),
    ("12345", []),
    ("vol-991", ["vol"]),
])
def test_subtokens(token, expect):
    assert _subtokens(token) == expect


def test_token_vector_deterministic_and_unit():
    v1 = token_vector("block", 32)
    v2 = token_vector("block", 32)
    np.testing.assert_array_equal(v1, v2)
    assert np.linalg.norm(v1) == pytest.approx(1.0)
    assert not np.allclose(token_vector("block", 32), token_vector("chunk", 32))


def test_vectorizer_similar_templates_close():
    vec = SemanticVectorizer(32).fit([
        "Receiving block <*> src <*>", "Deleting block <*>"])
    a = vec.transform("Receiving block <*> src <*>")
    b = vec.transform("Accepting block <*> src <*>")   # twisted variant
    c = vec.transform("completely unrelated words entirely")
    assert float(a @ b) > float(a @ c)


def test_vectorizer_unseen_template_nonzero():
    vec = SemanticVectorizer(16).fit(["a b"])
    v = vec.transform("never seen words")
    assert np.linalg.norm(v) > 0


def test_vectorizer_empty_template_zero():
    vec = SemanticVectorizer(16).fit(["a b"])
    assert np.linalg.norm(vec.transform("<*> 123")) == 0.0


NORMAL = [["Opening link", "Sending data ok", "Closing link"]] * 40
ANOM = [["Opening link", "Failure writing data", "Closing link"]] * 40


def test_supervised_separates_classes():
    det = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    assert det.predict([NORMAL[0]]) == [0]
    assert det.predict([ANOM[0]]) == [1]


def test_twisted_anomaly_still_caught():
    det = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    twisted = [["Opening link", "Failure writing records", "Closing link"]]
    assert det.predict(twisted) == [1]


def test_single_class_training_degenerates_to_constant():
    det = SemanticDetector(d=16).fit(NORMAL, [0] * len(NORMAL))
    assert det.single_class == 0
    assert det.predict([ANOM[0], NORMAL[0]]) == [0, 0]
    det1 = SemanticDetector(d=16).fit(ANOM, [1] * len(ANOM))
    assert det1.predict([NORMAL[0]]) == [1]


def test_decision_sign_matches_prediction():
    det = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    assert det.decision(ANOM[0]) > 0 > det.decision(NORMAL[0])


def test_empty_sequence_handled():
    det = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    det.predict([[]])  # must not raise


def test_fit_is_deterministic():
    d1 = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    d2 = SemanticDetector(d=16).fit(NORMAL + ANOM, [0] * 40 + [1] * 40)
    np.testing.assert_allclose(d1.w, d2.w)
