"""Unit tests for LCS / TF-IDF / n-gram helpers."""
import math

from hypothesis import given
from hypothesis import strategies as st

from repro.nlp.textutil import (
    contains_in_order,
    cosine,
    idf_table,
    lcs_length,
    ngrams,
    tf_vector,
    tfidf_vector,
)

words = st.lists(st.sampled_from(["a", "b", "c", "d"]), max_size=8)


def test_lcs_identical():
    assert lcs_length(["a", "b", "c"], ["a", "b", "c"]) == 3


def test_lcs_subsequence():
    assert lcs_length(["a", "x", "b", "y", "c"], ["a", "b", "c"]) == 3


def test_lcs_disjoint():
    assert lcs_length(["a"], ["b"]) == 0


def test_lcs_empty():
    assert lcs_length([], ["a"]) == 0


@given(words, words)
def test_lcs_symmetric_and_bounded(a, b):
    l = lcs_length(a, b)
    assert l == lcs_length(b, a)
    assert 0 <= l <= min(len(a), len(b))


def test_contains_in_order_true():
    assert contains_in_order(["a", "c"], ["a", "b", "c"])


def test_contains_in_order_false_wrong_order():
    assert not contains_in_order(["c", "a"], ["a", "b", "c"])


def test_contains_in_order_empty_needle():
    assert contains_in_order([], ["a"])


def test_tf_vector_counts():
    assert tf_vector(["a", "b", "a"]) == {"a": 2, "b": 1}


def test_cosine_identical_is_one():
    v = {"a": 1.0, "b": 2.0}
    assert abs(cosine(v, v) - 1.0) < 1e-12


def test_cosine_orthogonal_is_zero():
    assert cosine({"a": 1.0}, {"b": 1.0}) == 0.0


def test_cosine_empty():
    assert cosine({}, {"a": 1.0}) == 0.0


def test_idf_rare_word_higher():
    idf = idf_table([["a", "b"], ["a", "c"], ["a"]])
    assert idf["b"] > idf["a"]
    assert abs(idf["a"] - (math.log(4 / 4) + 1)) < 1e-12


def test_tfidf_uses_default_for_oov():
    v = tfidf_vector(["x", "x"], {}, default_idf=2.0)
    assert v == {"x": 4.0}


def test_ngrams_basic():
    assert ngrams(["a", "b", "c"], 2, 2) == [("a", "b"), ("b", "c")]


def test_ngrams_range():
    out = ngrams(["a", "b", "c"], 2, 3)
    assert ("a", "b", "c") in out and ("a", "b") in out


def test_ngrams_short_input():
    assert ngrams(["a"], 2, 4) == []
