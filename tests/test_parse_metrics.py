"""Unit tests for parsing metrics (grouping accuracy, Eq. 1)."""
import pytest

from repro.parsing import metrics as M


def test_grouping_accuracy_perfect():
    assert M.grouping_accuracy(["a", "a", "b"], [1, 1, 2]) == 1.0


def test_grouping_accuracy_split_gt_group():
    # gt group "a" split into clusters 1 and 3 -> all three lines wrong
    assert M.grouping_accuracy(["a", "a", "b"], [1, 3, 2]) == pytest.approx(1 / 3)


def test_grouping_accuracy_merged_groups():
    # both gt groups in one cluster -> every line wrong
    assert M.grouping_accuracy(["a", "a", "b"], [1, 1, 1]) == 0.0


def test_grouping_accuracy_label_names_irrelevant():
    assert M.grouping_accuracy(["a", "b"], ["x", "y"]) == 1.0
    assert M.grouping_accuracy(["a", "b"], [999, -1]) == 1.0


def test_grouping_accuracy_empty():
    assert M.grouping_accuracy([], []) == 1.0


def test_grouping_accuracy_length_mismatch():
    with pytest.raises(ValueError):
        M.grouping_accuracy(["a"], [1, 2])


def test_templates_per_gt():
    assert M.templates_per_gt(["a", "a", "b"], [1, 2, 3]) == pytest.approx(1.5)
    assert M.templates_per_gt(["a", "a"], [1, 1]) == 1.0
    assert M.templates_per_gt([], []) == 0.0


def _row(parsed_tpl, msg, gt_tpl, values):
    return (parsed_tpl, msg, gt_tpl, values)


def test_token_accuracy_perfect_parse():
    rows = [_row("send <*> bytes", "send 42 bytes", "send <*> bytes", ["42"])]
    assert M.token_accuracy(rows) == 1.0
    assert M.token_accuracy(rows, strict=True) == 1.0


def test_token_accuracy_wrong_static_token():
    # parser template says "recv" where the line says "send"
    rows = [_row("recv <*> bytes", "send 42 bytes", "send <*> bytes", ["42"])]
    assert M.token_accuracy(rows) == pytest.approx(2 / 3)


def test_token_accuracy_literal_vs_strict_on_overfit_template():
    # parser kept the value as a static token: literal metric forgives it
    # (token values still match); strict requires the variable role
    rows = [_row("send 42 bytes", "send 42 bytes", "send <*> bytes", ["42"])]
    assert M.token_accuracy(rows) == 1.0
    assert M.token_accuracy(rows, strict=True) == pytest.approx(2 / 3)


def test_token_accuracy_over_generalised_template():
    # parser wildcarded a static token: literal still matches (value =
    # original token) but strict counts the role error
    rows = [_row("send <*> <*>", "send 42 bytes", "send <*> bytes", ["42"])]
    assert M.token_accuracy(rows) == 1.0
    assert M.token_accuracy(rows, strict=True) == pytest.approx(2 / 3)


def test_token_accuracy_length_mismatch_penalised_in_strict():
    # a mis-merged template marks every token as a variable: the literal
    # metric cannot see it (values match themselves), strict can
    rows = [_row("a b", "a b c", "a b c", [])]
    assert M.token_accuracy(rows) == 1.0
    assert M.token_accuracy(rows, strict=True) == 0.0


def test_token_accuracy_embedded_variable_rendering():
    # template "dest: /<*>" renders the value inside the token
    rows = [_row("dest: <*>", "dest: /10.0.0.1", "dest: /<*>", ["10.0.0.1"])]
    assert M.token_accuracy(rows) == 1.0
    assert M.token_accuracy(rows, strict=True) == 1.0


def test_token_accuracy_empty_rows():
    assert M.token_accuracy([]) == 1.0


def test_token_accuracy_averages_over_lines():
    rows = [
        _row("a b", "a b", "a b", []),              # 1.0
        _row("x y", "a b", "a b", []),              # 0.0
    ]
    assert M.token_accuracy(rows) == pytest.approx(0.5)


def test_gt_token_stream_marks_variables():
    got = M.gt_token_stream("send <*> to /<*>", ["42", "h"], "send 42 to /h")
    assert got == [("send", False), ("42", True), ("to", False), ("/h", True)]


def test_gt_token_stream_structured_tail_is_variable():
    got = M.gt_token_stream("go", [], "go {a=1}")
    assert got[0] == ("go", False)
    assert got[1] == ("{a=1}", True)
