"""Unit tests for repro.nlp.tokenize."""
from hypothesis import given
from hypothesis import strategies as st

from repro.nlp.tokenize import PUNCT, STOPWORDS, content_tokens, is_stop, tokenize


def test_simple_split():
    assert tokenize("famous animated film") == ["famous", "animated", "film"]


def test_lowercases():
    assert tokenize("Famous Film") == ["famous", "film"]


def test_punct_isolated_trailing():
    assert tokenize("news.") == ["news", "."]


def test_punct_isolated_leading():
    assert tokenize(":news") == [":", "news"]


def test_punct_standalone():
    assert tokenize("a ; b") == ["a", ";", "b"]


def test_colon_prefix_title():
    assert tokenize("breaking: zorvex prime launches") == [
        "breaking", ":", "zorvex", "prime", "launches",
    ]


def test_empty():
    assert tokenize("") == []


def test_whitespace_only():
    assert tokenize("   ") == []


def test_idempotent_on_tokenized():
    toks = tokenize("breaking: zor news.")
    assert tokenize(" ".join(toks)) == toks


def test_is_stop_words_and_punct():
    assert is_stop("the")
    assert is_stop(";")
    assert not is_stop("film")


def test_content_tokens_keeps_order():
    assert content_tokens(["what", "are", "the", "rapid", "film"]) == ["rapid", "film"]


def test_stopwords_disjoint_from_punct():
    assert not (STOPWORDS & PUNCT)


@given(st.text(alphabet=st.characters(whitelist_categories=("Ll", "Nd"), max_codepoint=127), max_size=40))
def test_tokenize_never_raises_and_no_empty_tokens(s):
    toks = tokenize(s)
    assert all(toks)
