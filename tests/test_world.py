"""Tests for the synthetic world generator (gold ontology + click log)."""
import pandas as pd

from repro.nlp.tokenize import tokenize
from repro.world import WorldConfig, generate_ontology, generate_world
from repro.world import vocab


def test_entity_names_unique_within_namespace():
    names = {vocab.entity_name(i) for i in range(vocab.max_entities())}
    assert len(names) == vocab.max_entities()


def test_ontology_sizes(tiny_world):
    o = tiny_world.ontology
    cfg = o.config
    assert len(o.categories) == cfg.n_categories
    assert len(o.parents) == cfg.n_categories * cfg.n_suffixes_per_cat
    assert len(o.concepts) == len(o.parents) * cfg.concepts_per_suffix
    assert len(o.entities) == len(o.concepts) * cfg.entities_per_concept
    assert len(o.topics) == cfg.n_categories * cfg.topics_per_cat


def test_concept_phrases_unique(tiny_world):
    phrases = tiny_world.ontology.concepts.phrase
    assert phrases.is_unique


def test_concept_ends_with_parent_suffix(tiny_world):
    o = tiny_world.ontology
    parents = o.parents.set_index("suffix_id").phrase
    for _, c in o.concepts.iterrows():
        assert c.phrase.endswith(parents[c.suffix_id])


def test_every_concept_has_entities(tiny_world):
    o = tiny_world.ontology
    with_members = set(o.concept_entity.concept_id)
    assert set(o.concepts.concept_id) <= with_members


def test_event_phrase_contains_its_elements(tiny_world):
    o = tiny_world.ontology
    ents = o.entities.set_index("entity_id").phrase
    for _, ev in o.events.iterrows():
        toks = ev.phrase.split()
        assert ents[ev.entity_id].split() == toks[:2]
        assert ev.trigger in toks and ev.object in toks
        if ev.location:
            assert ev.location in toks
        assert ev.year in toks


def test_topic_events_share_pattern_and_concept(tiny_world):
    o = tiny_world.ontology
    for _, t in o.topics.iterrows():
        evs = o.events[o.events.topic_id == t.topic_id]
        assert len(evs) >= 1
        assert (evs.trigger == t.trigger).all()
        assert (evs["object"] == t.object).all()
        members = set(
            o.concept_entity[o.concept_entity.concept_id == t.concept_id].entity_id
        )
        assert set(evs.entity_id) <= members


def test_event_triples_unique(tiny_world):
    ev = tiny_world.ontology.events
    assert not ev.duplicated(subset=["entity_id", "trigger", "object"]).any()


def test_gold_correlate_pairs_symmetric_ordering(tiny_world):
    pairs = tiny_world.ontology.gold_correlate_pairs()
    assert all(a < b for a, b in pairs)
    assert pairs  # tiny world still has co-members


def test_clicks_positive_and_deduped(tiny_world):
    c = tiny_world.clicks
    assert (c["count"] > 0).all()
    assert not c.duplicated(subset=["qid", "doc_id"]).any()


def test_click_refs_exist(tiny_world):
    qids = set(tiny_world.queries.qid)
    dids = set(tiny_world.docs.doc_id)
    assert set(tiny_world.clicks.qid) <= qids
    assert set(tiny_world.clicks.doc_id) <= dids


def test_every_concept_has_queries_and_docs(tiny_world):
    q = tiny_world.queries
    d = tiny_world.docs
    for cid in tiny_world.ontology.concepts.concept_id:
        assert ((q.gold_kind == "concept") & (q.gold_id == cid)).any()
        assert ((d.gold_kind == "concept") & (d.gold_id == cid)).any()


def test_top_concept_query_exact_or_partial(tiny_world):
    # Primary query is the exact phrase (~70%) or the modifier-dropped
    # suffix (~30%).
    q = tiny_world.queries
    exact = 0
    for _, c in tiny_world.ontology.concepts.iterrows():
        mine = q[(q.gold_kind == "concept") & (q.gold_id == c.concept_id)]
        top = mine.iloc[0].text
        suffix = " ".join(c.phrase.split()[1:])
        assert top in (c.phrase, suffix)
        exact += top == c.phrase
    assert exact >= len(tiny_world.ontology.concepts) * 0.4  # ~70% on average


def test_all_gold_tokens_present_in_cluster_inputs(tiny_world):
    """Every gold phrase token appears in at least one query or title of
    its attention (the paper's extractability precondition)."""
    q, d = tiny_world.queries, tiny_world.docs
    for kind, frame, idcol in [
        ("concept", tiny_world.ontology.concepts, "concept_id"),
        ("event", tiny_world.ontology.events, "event_id"),
    ]:
        for _, a in frame.iterrows():
            texts = list(q[(q.gold_kind == kind) & (q.gold_id == a[idcol])].text)
            texts += list(d[(d.gold_kind == kind) & (d.gold_id == a[idcol])].title)
            bag = set(" ".join(texts).split())
            assert set(a.phrase.split()) <= bag, a.phrase


def test_sessions_reference_valid_queries(tiny_world):
    assert set(tiny_world.sessions.qid) <= set(tiny_world.queries.qid)


def test_sessions_have_two_steps(tiny_world):
    steps = tiny_world.sessions.groupby("session_id").step.count()
    assert (steps == 2).all()


def test_determinism_same_seed():
    w1 = generate_world(WorldConfig(n_categories=2, n_noise_docs=3, n_users=5))
    w2 = generate_world(WorldConfig(n_categories=2, n_noise_docs=3, n_users=5))
    pd.testing.assert_frame_equal(w1.queries, w2.queries)
    pd.testing.assert_frame_equal(w1.clicks, w2.clicks)
    pd.testing.assert_frame_equal(w1.ontology.events, w2.ontology.events)


def test_different_seed_differs():
    w1 = generate_ontology(WorldConfig(seed=1))
    w2 = generate_ontology(WorldConfig(seed=2))
    assert not w1.concepts.phrase.equals(w2.concepts.phrase)


def test_scaled_override():
    cfg = WorldConfig().scaled(n_categories=2)
    assert cfg.n_categories == 2
    assert cfg.concepts_per_suffix == WorldConfig().concepts_per_suffix


def test_doc_bodies_tokenizable(tiny_world):
    for body in tiny_world.docs.body.head(20):
        assert tokenize(body)
