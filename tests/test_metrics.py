"""Metric tests: EM / token-F1 / COV and multiclass F1 variants."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.metrics import exact_match, multiclass_f1, phrase_metrics, token_f1


def test_exact_match_hit():
    assert exact_match("famous film", "famous film") == 1.0


def test_exact_match_miss_on_extra_token():
    assert exact_match("the famous film", "famous film") == 0.0


def test_token_f1_perfect():
    assert token_f1("a b c", "a b c") == 1.0


def test_token_f1_partial():
    # pred {a,b}, gold {b,c}: P=0.5 R=0.5 F1=0.5
    assert token_f1("a b", "b c") == pytest.approx(0.5)


def test_token_f1_disjoint():
    assert token_f1("a", "b") == 0.0


def test_token_f1_multiset_counts():
    # duplicated token only matches once
    assert token_f1("a a", "a") == pytest.approx(2 * 0.5 * 1 / 1.5)


def test_phrase_metrics_empty_counts_zero():
    # Empty predictions score 0 in EM/F1; COV reports the non-empty rate.
    m = phrase_metrics(["a b", ""], ["a b", "a b"])
    assert m["COV"] == 0.5
    assert m["EM"] == pytest.approx(0.5)


def test_phrase_metrics_all_empty():
    m = phrase_metrics(["", ""], ["a", "b"])
    assert m == {"EM": 0.0, "F1": 0.0, "COV": 0.0}


def test_phrase_metrics_mixed():
    m = phrase_metrics(["a b", "x"], ["a b", "a b"])
    assert m["COV"] == 1.0
    assert m["EM"] == pytest.approx(0.5)


@given(st.lists(st.sampled_from(["a b", "b c", ""]), min_size=1, max_size=6))
def test_phrase_metrics_bounded_and_cov_dominates(preds):
    m = phrase_metrics(preds, ["a b"] * len(preds))
    assert 0 <= m["EM"] <= 1 and 0 <= m["F1"] <= 1 and 0 <= m["COV"] <= 1
    assert m["EM"] <= m["COV"] + 1e-12
    assert m["F1"] >= m["EM"]


def test_multiclass_perfect():
    m = multiclass_f1([0, 1, 2, 3], [0, 1, 2, 3], 4)
    assert m["F1-macro"] == 1.0
    assert m["F1-micro"] == 1.0
    assert m["F1-weighted"] == 1.0


def test_multiclass_all_wrong():
    m = multiclass_f1([0, 0], [1, 1], 2)
    assert m["F1-micro"] == 0.0


def test_multiclass_macro_penalizes_missing_class():
    # class 2 never predicted nor true -> contributes 0 to macro
    m = multiclass_f1([0, 1], [0, 1], 3)
    assert m["F1-macro"] == pytest.approx(2 / 3)
    assert m["F1-micro"] == 1.0
    assert m["F1-weighted"] == 1.0


def test_multiclass_weighted_vs_macro():
    # majority class correct, minority wrong: weighted > macro
    y_true = [0] * 9 + [1]
    y_pred = [0] * 9 + [0]
    m = multiclass_f1(y_true, y_pred, 2)
    assert m["F1-weighted"] > m["F1-macro"]


def test_multiclass_micro_equals_accuracy_single_label():
    y_true = [0, 1, 1, 0]
    y_pred = [0, 1, 0, 0]
    m = multiclass_f1(y_true, y_pred, 2)
    assert m["F1-micro"] == pytest.approx(0.75)
