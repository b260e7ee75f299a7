"""Tests for PPMI-SVD word vectors."""
import numpy as np
import pandas as pd
import pytest

from repro.core.embeddings import WordVectors, cooccurrence_pairs, train_word_vectors
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def corpus(spark):
    texts = pd.DataFrame(
        {
            "text": [
                "rapid film premiere tonight",
                "rapid film review today",
                "luxury suv guide today",
                "luxury suv premiere review",
                "rapid film luxury suv",
            ]
            * 3
        }
    )
    return spark.createDataFrame(texts), texts


def test_cooccurrence_window(spark, corpus):
    df, _ = corpus
    pairs = {
        (r.a, r.b): r.n for r in cooccurrence_pairs(spark, df, window=1).collect()
    }
    assert pairs[("rapid", "film")] >= 6
    assert ("rapid", "premiere") not in pairs  # distance 2 > window 1


def test_cooccurrence_counts_scale_with_window(spark, corpus):
    df, _ = corpus
    n1 = cooccurrence_pairs(spark, df, window=1).count()
    n3 = cooccurrence_pairs(spark, df, window=3).count()
    assert n3 > n1


def test_train_vectors_similar_words_close(spark, corpus):
    df, _ = corpus
    wv = train_word_vectors(spark, df, dim=8)
    assert "rapid" in wv and "film" in wv
    # co-occurring tokens are more similar than unrelated ones
    assert wv.similarity("rapid", "film") > wv.similarity("rapid", "guide")


def test_phrase_vector_mean_and_norm(spark, corpus):
    df, _ = corpus
    wv = train_word_vectors(spark, df, dim=8)
    v = wv.phrase_vector("rapid film")
    assert v.shape == (8,) or v.shape == (min(8, len(wv.vocab)),)
    assert abs(np.linalg.norm(v) - 1.0) < 1e-9


def test_phrase_vector_oov_zero(spark, corpus):
    df, _ = corpus
    wv = train_word_vectors(spark, df, dim=8)
    assert np.allclose(wv.phrase_vector("zzz qqq"), 0.0)


def test_vector_lookup(spark, corpus):
    df, _ = corpus
    wv = train_word_vectors(spark, df, dim=8)
    assert wv.vector("rapid") is not None
    assert wv.vector("zzz") is None


def test_empty_corpus(spark):
    df = spark.createDataFrame(pd.DataFrame({"text": [""]}))
    wv = train_word_vectors(spark, df, dim=4)
    assert len(wv.vocab) == 0
