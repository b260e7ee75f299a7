"""Unit tests for the baseline methods of Tables 5-7."""
import pytest

from repro.baselines import autophrase as ap
from repro.baselines import coverrank as cr
from repro.baselines import crf_tagger as ct
from repro.baselines import match_align as ma
from repro.baselines import seq2seq as s2s
from repro.baselines import textrank as tr


# ---------------------------------------------------------------- TextRank
def test_textrank_pagerank_sums_to_one():
    adj = {"a": {"b": 1.0}, "b": {"a": 1.0, "c": 1.0}, "c": {"b": 1.0}}
    scores = tr.pagerank(adj)
    assert sum(scores.values()) == pytest.approx(1.0, abs=1e-6)


def test_textrank_pagerank_center_highest():
    adj = {"a": {"b": 1.0}, "b": {"a": 1.0, "c": 1.0}, "c": {"b": 1.0}}
    scores = tr.pagerank(adj)
    assert scores["b"] > scores["a"]


def test_textrank_extract_orders_by_appearance():
    out = tr.extract(
        ["famous animated film"], ["review famous animated film classics today"]
    )
    toks = out.split()
    assert toks.index("famous") < toks.index("film")


def test_textrank_extract_k_tokens():
    out = tr.extract(["a b c d e f g".replace(" ", " x").replace("x", "")], [])
    assert len(out.split()) <= 5


def test_textrank_empty_input():
    assert tr.extract([], []) == ""


# -------------------------------------------------------------- AutoPhrase
def test_autophrase_learns_frequent_ngram():
    corpus = ["rapid film review"] * 5 + ["luxury suv guide"] * 5
    miner = ap.AutoPhraseMiner(min_count=3).fit(corpus)
    assert ("rapid", "film") in miner.quality


def test_autophrase_respects_min_count():
    miner = ap.AutoPhraseMiner(min_count=3).fit(["rare pair here"])
    assert ("rare", "pair") not in miner.quality


def test_autophrase_extract_only_present_phrases():
    corpus = ["rapid film review"] * 5 + ["luxury suv guide"] * 5
    miner = ap.AutoPhraseMiner(min_count=3).fit(corpus)
    out = miner.extract(["rapid film"], ["the rapid film ranked"])
    assert "suv" not in out
    assert "rapid" in out


def test_autophrase_extract_empty_when_nothing_known():
    miner = ap.AutoPhraseMiner(min_count=3).fit(["x y z"] * 4)
    assert miner.extract(["unrelated words"], []) == ""


# ------------------------------------------------------------- Match/Align
def test_apply_pattern_prefix():
    slot = ma.apply_pattern("what are the rapid film".split(), (("what", "are", "the"), ()))
    assert slot == ["rapid", "film"]


def test_apply_pattern_no_match():
    assert ma.apply_pattern("rapid film".split(), (("top",), ())) is None


def test_apply_pattern_rejects_stop_slot():
    assert ma.apply_pattern("what are the of".split(), (("what", "are", "the"), ())) is None


def test_bootstrap_learns_suffix_pattern():
    corpus = (
        ["what are the rapid film", "rapid film review", "what are the luxury suv",
         "luxury suv review", "what are the classic song", "classic song review"]
    )
    boot = ma.Bootstrapper(min_pattern_support=3).fit(corpus)
    assert ((), ("review",)) in boot.patterns


def test_match_extract_with_learned_pattern():
    corpus = (
        ["what are the rapid film", "rapid film review", "what are the luxury suv",
         "luxury suv review", "what are the classic song", "classic song review"]
    )
    boot = ma.Bootstrapper(min_pattern_support=3).fit(corpus)
    assert ma.match_extract(boot, ["rapid film review"]) == "rapid film"


def test_match_extract_empty_without_affix():
    boot = ma.Bootstrapper().fit(["what are the rapid film"])
    assert ma.match_extract(boot, ["rapid film"]) == ""


def test_align_chunk_exact():
    chunk = ma.align_chunk("rapid film".split(), "review rapid film ranked".split())
    assert chunk == ["rapid", "film"]


def test_align_chunk_keeps_insertion_inside_span():
    chunk = ma.align_chunk("rapid film".split(), "rapid luxury film".split())
    assert chunk == ["rapid", "luxury", "film"]


def test_align_chunk_order_matters():
    assert ma.align_chunk("film rapid".split(), "rapid film".split()) is None


def test_align_chunk_ignores_stop_tokens_in_query():
    chunk = ma.align_chunk("what are the rapid film".split(), "review rapid film".split())
    assert chunk == ["rapid", "film"]


def test_align_extract_first_title_wins():
    out = ma.align_extract(["rapid film"], ["rapid luxury film", "review rapid film"])
    assert out == "rapid luxury film"


def test_match_align_most_frequent():
    boot = ma.Bootstrapper().fit([])
    out = ma.match_align_extract(
        boot, ["rapid film"], ["review rapid film", "the rapid film ranked"]
    )
    assert out == "rapid film"


# ---------------------------------------------------------------- CoverRank
def test_split_subtitles():
    subs = cr.split_subtitles("zorba prime launches premiere ; report news")
    assert subs == [["zorba", "prime", "launches", "premiere"], ["report", "news"]]


def test_coverrank_prefers_covering_subtitle():
    out = cr.extract(
        ["zorba prime launches premiere"],
        ["zorba prime launches premiere ; report news"],
    )
    assert out == "zorba prime launches premiere"


def test_coverrank_length_filter():
    # 2-token candidates are inadmissible
    out = cr.extract(["ab cd"], ["ab cd ; xy zz"])
    assert out == ""


def test_coverrank_tie_breaks_by_rank():
    out = cr.extract(
        ["zorba prime premiere"],
        ["zorba prime premiere first", "zorba prime premiere second"],
    )
    assert out == "zorba prime premiere"  # the query itself (rank 0)


def test_coverrank_top_candidates_k():
    cands = cr.top_candidates(
        ["zorba prime launches premiere"],
        ["zorba prime launches premiere ; report news today"],
        k=2,
    )
    assert len(cands) <= 2


# ------------------------------------------------------------- CRF taggers
def _phrase_train_data():
    seqs = [
        "review rapid film".split(),
        "the rapid film ranked".split(),
        "summary luxury suv".split(),
        "the luxury suv ranked".split(),
    ]
    labs = [
        ["O", "P", "P"],
        ["O", "P", "P", "O"],
        ["O", "P", "P"],
        ["O", "P", "P", "O"],
    ]
    return seqs, labs


def test_perceptron_learns_training_data():
    seqs, labs = _phrase_train_data()
    t = ct.PerceptronTagger(["O", "P"], epochs=8).fit(seqs, labs)
    assert t.predict("review rapid film".split()) == ["O", "P", "P"]


def test_perceptron_generalizes_to_same_pattern():
    seqs, labs = _phrase_train_data()
    t = ct.PerceptronTagger(["O", "P"], epochs=8).fit(seqs, labs)
    assert t.predict("review luxury suv".split()) == ["O", "P", "P"]


def test_perceptron_without_transitions_runs():
    seqs, labs = _phrase_train_data()
    t = ct.PerceptronTagger(["O", "P"], use_transitions=False, epochs=8).fit(seqs, labs)
    assert len(t.predict("review rapid film".split())) == 3


def test_tag_phrase_joins_positive_tokens():
    seqs, labs = _phrase_train_data()
    t = ct.PerceptronTagger(["O", "P"], epochs=8).fit(seqs, labs)
    assert ct.tag_phrase(t, "review rapid film") == "rapid film"


def test_predict_empty_sequence():
    t = ct.PerceptronTagger(["O", "P"])
    assert t.predict([]) == []


def test_phrase_labels():
    assert ct.phrase_labels(["a", "b", "c"], "a c") == ["P", "O", "P"]


def test_element_label_of():
    r = {"entity_toks": ["zorba", "prime"], "trigger_toks": ["launches"], "location_toks": []}
    assert ct.element_label_of("zorba", r) == "entity"
    assert ct.element_label_of("launches", r) == "trigger"
    assert ct.element_label_of("premiere", r) == "other"


def test_extract_event_lstm_crf_length_filter():
    seqs = ["zorba prime launches premiere ; report".split()] * 3
    labs = [["P", "P", "P", "P", "O", "O"]] * 3
    t = ct.PerceptronTagger(["O", "P"], epochs=6).fit(seqs, labs)
    out = ct.extract_event_lstm_crf(t, ["zorba prime launches premiere ; report"])
    assert out == "zorba prime launches premiere"


# ----------------------------------------------------------------- seq2seq
def test_bigram_generator_reproduces_training_phrase():
    lm = s2s.BigramGenerator().fit(["rapid film", "rapid film", "luxury suv"])
    out = lm.generate(["rapid things"], [])
    assert out.startswith("rapid")


def test_bigram_generator_unknown_seed_falls_back():
    lm = s2s.BigramGenerator().fit(["rapid film"])
    out = lm.generate(["zzz qqq"], [])
    assert out != ""


def test_bigram_generator_no_training():
    lm = s2s.BigramGenerator().fit([])
    assert lm.generate(["a b"], []) == ""


def test_bigram_generator_no_repeats():
    lm = s2s.BigramGenerator().fit(["a b a b a"])
    toks = lm.generate(["a"], []).split()
    assert len(toks) == len(set(toks))
