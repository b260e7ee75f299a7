"""Unit tests for the lexicon POS/NER taggers."""
from repro.nlp.tagger import NER_TAGS, POS_TAGS, ner_tag, pos_tag
from repro.world import vocab


def test_pos_heads_are_nouns():
    assert pos_tag(["film", "phone"]) == ["NOUN", "NOUN"]


def test_pos_modifiers_are_adj():
    assert pos_tag(["famous", "animated"]) == ["ADJ", "ADJ"]


def test_pos_triggers_are_verbs():
    assert pos_tag(["launches", "wins"]) == ["VERB", "VERB"]


def test_pos_entity_tokens_are_propn_when_covered():
    a, b = vocab.entity_name(2)  # idx 2 is lexicon-covered
    assert pos_tag([a, b]) == ["PROPN", "PROPN"]


def test_pos_uncovered_entity_first_token_backs_off_to_noun():
    a, b = vocab.entity_name(0)  # idx 0 is not lexicon-covered
    assert pos_tag([a, b]) == ["NOUN", "PROPN"]


def test_pos_stopword_overrides():
    assert pos_tag(["the", "in"]) == ["FUNC", "FUNC"]


def test_pos_punct():
    assert pos_tag([";", ":"]) == ["PUNCT", "PUNCT"]


def test_pos_year_is_num():
    assert pos_tag(["2018"]) == ["NUM"]


def test_pos_oov_backoff_noun():
    assert pos_tag(["qwertyuiop"]) == ["NOUN"]


def test_ner_entity_first_token():
    a, _ = vocab.entity_name(3)
    assert ner_tag([a]) == ["ENT"]


def test_ner_location_covered_and_uncovered():
    assert ner_tag(["tokyo", "london"]) == ["LOC", "LOC"]
    assert ner_tag(["paris"]) == ["O"]  # outside the 60% lexicon


def test_ner_year_is_time():
    assert ner_tag(["2019", "1234"]) == ["TIME", "TIME"]


def test_ner_oov_is_o():
    assert ner_tag(["film", "qwerty"]) == ["O", "O"]


def test_tagsets_cover_all_outputs():
    toks = ["famous", "film", "launches", "paris", "2018", "the", ";", "zzz"]
    assert set(pos_tag(toks)) <= set(POS_TAGS)
    assert set(ner_tag(toks)) <= set(NER_TAGS)


def test_same_length_as_input():
    toks = ["a"] * 17
    assert len(pos_tag(toks)) == 17
    assert len(ner_tag(toks)) == 17
