"""Ground-truth ontology sampler.

The paper evaluates GIANT against human judgment over Tencent's click
logs. Our substitute is a *known* ontology sampled from
``repro.world.vocab``: categories, parent concepts (suffix bases), leaf
concepts, entities, topics and events — with all gold memberships kept,
so every pipeline stage can be scored mechanically (DESIGN.md §2).

The gold tables double as the evaluation key for Table 2 (edge
accuracy) and as the source from which ``clicklog_gen`` synthesizes
queries, documents and clicks.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.world import vocab


@dataclass(frozen=True)
class WorldConfig:
    """Knobs for world size. Defaults are unit-test scale (~36 concepts)."""

    n_categories: int = 6
    n_suffixes_per_cat: int = 2
    concepts_per_suffix: int = 3
    entities_per_concept: int = 3
    topics_per_cat: int = 1
    events_per_topic: int = 3
    extra_events_per_cat: int = 2
    docs_per_attention: int = 4
    n_noise_docs: int = 20
    noise_click_prob: float = 0.04
    n_users: int = 40
    sessions_per_user: int = 3
    seed: int = 7

    def scaled(self, **kw) -> "WorldConfig":
        """A copy with some fields overridden (frozen-dataclass helper)."""
        d = {f: getattr(self, f) for f in self.__dataclass_fields__}
        d.update(kw)
        return WorldConfig(**d)


#: Benchmark-scale config (~100 MB of generated text at click-log level).
BENCH_CONFIG = WorldConfig(
    n_categories=10,
    n_suffixes_per_cat=4,
    concepts_per_suffix=5,
    entities_per_concept=4,
    topics_per_cat=3,
    events_per_topic=3,
    extra_events_per_cat=6,
    docs_per_attention=5,
    n_noise_docs=120,
    n_users=200,
    sessions_per_user=4,
    seed=11,
)


@dataclass
class Ontology:
    """Gold ontology frames. Phrases are space-joined lowercase tokens."""

    categories: pd.DataFrame  # cat_id, name
    parents: pd.DataFrame     # suffix_id, phrase, cat_id
    concepts: pd.DataFrame    # concept_id, phrase, suffix_id, cat_id, modifier
    entities: pd.DataFrame    # entity_id, phrase, cat_id
    concept_entity: pd.DataFrame  # concept_id, entity_id  (gold isA)
    topics: pd.DataFrame      # topic_id, phrase, concept_id, trigger, object, cat_id
    events: pd.DataFrame      # event_id, phrase, entity_id, trigger, object,
    #                           location, year, topic_id, cat_id, time
    config: WorldConfig = field(default=None)  # type: ignore[assignment]

    def concept_tokens(self, concept_id: int) -> list[str]:
        return self.concepts.loc[
            self.concepts.concept_id == concept_id, "phrase"
        ].iloc[0].split()

    def gold_correlate_pairs(self) -> set[tuple[int, int]]:
        """Entity pairs that truly co-belong: same concept or same topic."""
        pairs: set[tuple[int, int]] = set()
        for _, grp in self.concept_entity.groupby("concept_id"):
            es = sorted(grp.entity_id)
            pairs.update(
                (a, b) for i, a in enumerate(es) for b in es[i + 1 :]
            )
        ev = self.events.dropna(subset=["topic_id"])
        for _, grp in ev.groupby("topic_id"):
            es = sorted(grp.entity_id)
            pairs.update(
                (a, b) for i, a in enumerate(es) for b in es[i + 1 :]
            )
        return pairs


def generate_ontology(cfg: WorldConfig) -> Ontology:
    """Sample a gold ontology deterministically from ``cfg.seed``."""
    rng = np.random.default_rng(cfg.seed)
    cats = list(vocab.ALL_CATEGORIES[: cfg.n_categories])
    cat_rows = [{"cat_id": i, "name": c} for i, c in enumerate(cats)]

    parent_rows, concept_rows = [], []
    suffix_id = 0
    concept_id = 0
    for ci, cat in enumerate(cats):
        heads = vocab.CATEGORY_HEADS[cat]
        # Enumerate distinct suffix bases: bare heads first, then
        # (suffix-modifier, head) combinations.
        combos: list[list[str]] = [[h] for h in heads]
        sufmods = rng.permutation(vocab.SUFFIX_MODIFIERS).tolist()
        for h in heads:
            for m in sufmods:
                combos.append([m, h])
        for j in range(cfg.n_suffixes_per_cat):
            suffix_tokens = combos[j % len(combos)]
            parent_rows.append(
                {"suffix_id": suffix_id, "phrase": " ".join(suffix_tokens), "cat_id": ci}
            )
            mods = rng.choice(
                len(vocab.MODIFIERS),
                size=min(cfg.concepts_per_suffix, len(vocab.MODIFIERS)),
                replace=False,
            )
            for m in mods:
                mod = vocab.MODIFIERS[int(m)]
                concept_rows.append(
                    {
                        "concept_id": concept_id,
                        "phrase": " ".join([mod] + suffix_tokens),
                        "suffix_id": suffix_id,
                        "cat_id": ci,
                        "modifier": mod,
                    }
                )
                concept_id += 1
            suffix_id += 1

    concepts = pd.DataFrame(concept_rows)

    entity_rows, ce_rows = [], []
    eid = 0
    for _, c in concepts.iterrows():
        for _ in range(cfg.entities_per_concept):
            assert eid < vocab.max_entities(), "entity namespace exhausted"
            a, b = vocab.entity_name(eid)
            entity_rows.append(
                {"entity_id": eid, "phrase": f"{a} {b}", "cat_id": int(c.cat_id)}
            )
            ce_rows.append({"concept_id": int(c.concept_id), "entity_id": eid})
            eid += 1
    # Secondary memberships: ~20% of entities also belong to a sibling
    # concept under the same parent suffix (multi-concept entities, as
    # "Iron Man" belongs to both "superheroes" and "Marvel superheroes").
    ce = pd.DataFrame(ce_rows)
    primary = ce.merge(concepts[["concept_id", "suffix_id"]], on="concept_id")
    for _, row in primary.iterrows():
        if rng.random() < 0.2:
            siblings = concepts[
                (concepts.suffix_id == row.suffix_id)
                & (concepts.concept_id != row.concept_id)
            ]
            if len(siblings):
                pick = siblings.iloc[int(rng.integers(len(siblings)))]
                ce_rows.append(
                    {"concept_id": int(pick.concept_id), "entity_id": int(row.entity_id)}
                )
    concept_entity = pd.DataFrame(ce_rows).drop_duplicates().reset_index(drop=True)

    entities = pd.DataFrame(entity_rows)

    topic_rows, event_rows = [], []
    topic_id = 0
    event_id = 0
    used_triples: set[tuple[int, str, str]] = set()
    for ci, cat in enumerate(cats):
        objs = vocab.CATEGORY_OBJECTS[cat]
        cat_concepts = concepts[concepts.cat_id == ci]
        for _t in range(cfg.topics_per_cat):
            c = cat_concepts.iloc[int(rng.integers(len(cat_concepts)))]
            members = concept_entity[concept_entity.concept_id == c.concept_id]
            trig = vocab.TRIGGERS[int(rng.integers(len(vocab.TRIGGERS)))]
            obj = objs[int(rng.integers(len(objs)))]
            topic_rows.append(
                {
                    "topic_id": topic_id,
                    "phrase": f"{c.phrase} {trig} {obj}",
                    "concept_id": int(c.concept_id),
                    "trigger": trig,
                    "object": obj,
                    "cat_id": ci,
                }
            )
            n_ev = min(cfg.events_per_topic, len(members))
            for k in range(n_ev):
                ent = entities[
                    entities.entity_id == int(members.iloc[k].entity_id)
                ].iloc[0]
                year = vocab.YEARS[int(rng.integers(len(vocab.YEARS)))]
                loc = (
                    vocab.LOCATIONS[int(rng.integers(len(vocab.LOCATIONS)))]
                    if rng.random() < 0.5
                    else None
                )
                toks = ent.phrase.split() + [trig, obj]
                if loc:
                    toks.append(loc)
                toks.append(year)
                event_rows.append(
                    {
                        "event_id": event_id,
                        "phrase": " ".join(toks),
                        "entity_id": int(ent.entity_id),
                        "trigger": trig,
                        "object": obj,
                        "location": loc,
                        "year": year,
                        "topic_id": topic_id,
                        "cat_id": ci,
                        "time": f"{year}-{(event_id % 12) + 1:02d}-{(event_id % 27) + 1:02d}",
                    }
                )
                used_triples.add((int(ent.entity_id), trig, obj))
                event_id += 1
            topic_id += 1
        # Standalone events (no topic).
        cat_entities = entities[entities.cat_id == ci]
        tries = 0
        made = 0
        while made < cfg.extra_events_per_cat and tries < 50 * cfg.extra_events_per_cat:
            tries += 1
            ent = cat_entities.iloc[int(rng.integers(len(cat_entities)))]
            trig = vocab.TRIGGERS[int(rng.integers(len(vocab.TRIGGERS)))]
            obj = objs[int(rng.integers(len(objs)))]
            key = (int(ent.entity_id), trig, obj)
            if key in used_triples:
                continue
            used_triples.add(key)
            year = vocab.YEARS[int(rng.integers(len(vocab.YEARS)))]
            loc = (
                vocab.LOCATIONS[int(rng.integers(len(vocab.LOCATIONS)))]
                if rng.random() < 0.5
                else None
            )
            toks = ent.phrase.split() + [trig, obj]
            if loc:
                toks.append(loc)
            toks.append(year)
            event_rows.append(
                {
                    "event_id": event_id,
                    "phrase": " ".join(toks),
                    "entity_id": int(ent.entity_id),
                    "trigger": trig,
                    "object": obj,
                    "location": loc,
                    "year": year,
                    "topic_id": None,
                    "cat_id": ci,
                    "time": f"{year}-{(event_id % 12) + 1:02d}-{(event_id % 27) + 1:02d}",
                }
            )
            event_id += 1
            made += 1

    return Ontology(
        categories=pd.DataFrame(cat_rows),
        parents=pd.DataFrame(parent_rows),
        concepts=concepts,
        entities=entities,
        concept_entity=concept_entity,
        topics=pd.DataFrame(topic_rows),
        events=pd.DataFrame(event_rows),
        config=cfg,
    )
