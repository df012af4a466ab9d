"""Unit tests for evaluation bookkeeping (evaluation.labels)."""
import pytest

from repro.classify.pools import make_report
from repro.evaluation.labels import (POOL_OF_SOURCE, gt_criticality, gt_pool,
                                     prf)


def test_prf_perfect():
    r = prf([1, 0, 1], [1, 0, 1])
    assert (r.precision, r.recall, r.f1) == (1.0, 1.0, 1.0)
    assert (r.tp, r.fp, r.fn) == (2, 0, 1 - 1)


def test_prf_definitions_match_paper():
    # §III: precision = TP/(TP+FP), recall = TP/(TP+FN)
    r = prf([1, 1, 0, 0], [1, 0, 1, 0])
    assert r.tp == 1 and r.fp == 1 and r.fn == 1
    assert r.precision == 0.5 and r.recall == 0.5 and r.f1 == 0.5


def test_prf_no_positives_predicted():
    r = prf([1, 1], [0, 0])
    assert r.precision == 0.0 and r.recall == 0.0 and r.f1 == 0.0


def test_prf_length_mismatch():
    with pytest.raises(ValueError):
        prf([1], [1, 0])


def test_prf_row_rounding():
    row = prf([1, 0, 0], [1, 1, 0]).row()
    assert set(row) == {"precision", "recall", "f1"}


@pytest.mark.parametrize("source,pool", sorted(POOL_OF_SOURCE.items()))
def test_gt_pool_mapping(source, pool):
    rep = make_report("s", source, ["x"], ["INFO"], "seq")
    assert gt_pool(rep) == pool


def test_gt_pool_unknown_source_defaults():
    rep = make_report("s", "mystery", ["x"], ["INFO"], "seq")
    assert gt_pool(rep) == "compute"


def test_gt_criticality_policy():
    seq_err = make_report("a", "net", ["x"], ["INFO", "ERROR"], "seq")
    seq_silent = make_report("b", "net", ["x"], ["INFO"], "seq")
    quant = make_report("c", "net", ["x"], ["INFO"], "quant")
    quant_sec = make_report("d", "auth", ["x"], ["INFO"], "quant")
    assert gt_criticality(seq_err) == "high"
    assert gt_criticality(seq_silent) == "moderate"
    assert gt_criticality(quant) == "low"
    assert gt_criticality(quant_sec) == "moderate"
