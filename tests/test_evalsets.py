"""Tests for CMD/EMD-lite dataset construction."""
from repro.evalsets import concept_examples, event_examples, split


def test_one_example_per_attention(examples, tiny_world):
    o = tiny_world.ontology
    assert len(concept_examples(examples)) == len(o.concepts)
    assert len(event_examples(examples)) == len(o.events)


def test_gold_matches_ontology(examples, tiny_world):
    o = tiny_world.ontology
    golds = set(concept_examples(examples).gold)
    assert golds == set(o.concepts.phrase)
    assert set(event_examples(examples).gold) == set(o.events.phrase)


def test_queries_and_titles_nonempty(examples):
    for _, r in examples.iterrows():
        assert len(r["queries"]) >= 1
        assert len(r["titles"]) >= 1


def test_top_query_overlaps_gold_content(examples):
    """The seed query is the attention's primary query: most of its
    content tokens come from the gold phrase (at most one filler)."""
    from repro.nlp.tokenize import content_tokens, tokenize

    for _, r in examples.iterrows():
        q_content = set(content_tokens(tokenize(r["queries"][0])))
        gold_toks = set(tokenize(r["gold"]))
        assert len(q_content - gold_toks) <= 1
        assert q_content & gold_toks


def test_event_examples_have_element_golds(examples):
    emd = event_examples(examples)
    for _, r in emd.iterrows():
        assert len(r["entity_toks"]) == 2
        assert len(r["trigger_toks"]) == 1
        assert r["gold"].startswith(" ".join(r["entity_toks"]))


def test_concept_examples_have_no_element_golds(examples):
    cmd = concept_examples(examples)
    for _, r in cmd.iterrows():
        assert r["entity_toks"] == [] and r["trigger_toks"] == []


def test_split_partition(examples):
    names = {s for s in examples.split}
    assert names <= {"train", "dev", "test"}
    n = len(examples)
    assert len(split(examples, "train")) + len(split(examples, "dev")) + len(
        split(examples, "test")
    ) == n


def test_split_deterministic(examples):
    a = examples.split.tolist()
    b = examples.split.tolist()
    assert a == b


def test_example_ids_unique(examples):
    assert examples.example_id.is_unique
