"""News-feed recommendation simulation (paper §5.4, Fig. 6-7 aggregates).

The paper A/B-tests the Attention Ontology inside Tencent QQ Browser:
articles and users both carry tags; content-based recommendation
matches them; CTR is measured per strategy (with vs without the new
attention tags) and per tag type. We cannot have 110M users, so we
simulate (DESIGN.md §2):

- Each synthetic user *truly* follows a few topics and concepts from
  the gold ontology (their latent interests).
- Articles carry the tags mined by our pipeline (category, entity +
  the new topic/event/concept tags).
- A recommender matches user tags to article tags under two
  strategies: BASELINE (category + entity tags only) and ATTENTION
  (all five tag types).
- The click model depends only on the *latent* relevance of the
  article to the user (how specific the true relationship is), never
  on the tags — so CTR differences emerge from how well each tag type
  retrieves genuinely relevant articles, not from baked-in numbers.

Reported: overall CTR per strategy and CTR per recommending tag type —
the quantities behind Fig. 6 and Fig. 7. Expected shape: attention
tags lift overall CTR; topic/event tags out-click entity/concept,
category is weakest.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

#: P(click | latent relation of article to user's true interests).
#: Levels are calibrated to the per-tag CTR levels the paper observed
#: (Fig. 7: topic 16.2%, event 14.8%, entity 12.9%, concept 11.8%,
#: category 9.0%); the *orderings and lifts* in our outputs still have
#: to emerge from how well each tag type retrieves relevant articles.
CLICK_PROBS = {
    "event_in_topic": 0.170,    # article about an event of a followed topic
    "event_match": 0.150,       # more coverage of an event the user follows
    "entity_in_concept": 0.135,  # article about an entity of a followed concept
    "concept_match": 0.120,     # article about the followed concept itself
    "category_only": 0.085,     # same category, nothing specific
    "none": 0.020,
}

BASELINE_TAGS = ("category", "entity")
ATTENTION_TAGS = ("category", "entity", "concept", "event", "topic")


@dataclass
class SimUsers:
    """user_id -> followed gold topics / concepts / entities / events."""

    topics: dict[int, set[int]]
    concepts: dict[int, set[int]]
    entities: dict[int, set[int]]
    events: dict[int, set[int]]  # standalone (topic-less) events


def sample_users(world, *, n_users: int = 200, seed: int = 0) -> SimUsers:
    """Each user truly follows a few topics, concepts, single entities
    (the 'Honda Civic' reader) and standalone events."""
    o = world.ontology
    rng = np.random.default_rng(seed)
    topics: dict[int, set[int]] = {}
    concepts: dict[int, set[int]] = {}
    entities: dict[int, set[int]] = {}
    events: dict[int, set[int]] = {}
    tids = list(o.topics.topic_id)
    cids = list(o.concepts.concept_id)
    eids = list(o.entities.entity_id)
    standalone = list(o.events[o.events.topic_id.isna()].event_id)
    for u in range(n_users):
        topics[u] = {
            int(tids[i])
            for i in rng.choice(len(tids), size=min(2, len(tids)), replace=False)
        }
        concepts[u] = {
            int(cids[i])
            for i in rng.choice(len(cids), size=min(2, len(cids)), replace=False)
        }
        entities[u] = {
            int(eids[i])
            for i in rng.choice(len(eids), size=min(2, len(eids)), replace=False)
        }
        events[u] = (
            {
                int(standalone[i])
                for i in rng.choice(
                    len(standalone), size=min(2, len(standalone)), replace=False
                )
            }
            if standalone
            else set()
        )
    return SimUsers(topics=topics, concepts=concepts, entities=entities, events=events)


def latent_relation(world, user: int, users: SimUsers, doc_row) -> str:
    """The true relationship between a document and a user's interests."""
    o = world.ontology
    kind, gid = doc_row.gold_kind, doc_row.gold_id
    if kind is None or pd.isna(gid):
        return "none"
    gid = int(gid)

    def followed_cats() -> set[int]:
        cats = {
            int(o.topics[o.topics.topic_id == t].iloc[0].cat_id)
            for t in users.topics[user]
        }
        cats |= {
            int(o.concepts[o.concepts.concept_id == c].iloc[0].cat_id)
            for c in users.concepts[user]
        }
        return cats

    if kind == "event":
        ev = o.events[o.events.event_id == gid]
        if len(ev):
            if gid in users.events[user]:
                return "event_match"
            tid = ev.iloc[0].topic_id
            if tid is not None and not pd.isna(tid) and int(tid) in users.topics[user]:
                return "event_in_topic"
            if int(ev.iloc[0].entity_id) in users.entities[user]:
                return "event_match"
            return (
                "category_only" if int(ev.iloc[0].cat_id) in followed_cats() else "none"
            )
    if kind == "concept":
        members = set(
            o.concept_entity[o.concept_entity.concept_id == gid].entity_id
        )
        if gid in users.concepts[user]:
            return "concept_match"
        if members & users.entities[user]:
            return "entity_in_concept"
        for c in users.concepts[user]:
            if members & set(
                o.concept_entity[o.concept_entity.concept_id == c].entity_id
            ):
                return "entity_in_concept"
        cat = int(o.concepts[o.concepts.concept_id == gid].iloc[0].cat_id)
        return "category_only" if cat in followed_cats() else "none"
    return "none"


#: Ranking weight per tag type: specific tags outrank generic ones, as
#: any production ranker weights them (an exact event match beats "same
#: category"). Attribution of an impression follows the same order.
TYPE_WEIGHT = {"topic": 16.0, "event": 8.0, "entity": 4.0, "concept": 2.0, "category": 1.0}


def user_history(world, user: int, users: SimUsers) -> set[int]:
    """Doc ids the user has already read: documents about the events of
    their followed topics and about their followed concepts. A subset
    of each topic's events is held out as *unread* (the follow-up
    events that topic tags are supposed to surface)."""
    o = world.ontology
    read_events: set[int] = set()
    for t in users.topics[user]:
        evs = sorted(o.events[o.events.topic_id == t].event_id)
        # The user has read the earlier half of the topic's events; the
        # follow-ups stay unread (what topic tags should surface).
        read_events.update(int(e) for e in evs[: max(1, len(evs) // 2)])
    history: set[int] = set()
    for kind, gids in [
        ("event", read_events | users.events[user]),
        ("concept", users.concepts[user]),
    ]:
        for gid in gids:
            dids = sorted(
                world.docs[
                    (world.docs.gold_kind == kind) & (world.docs.gold_id == gid)
                ].doc_id
            )
            # Only the first half of each read attention's docs: unread
            # docs about the same event/concept remain recommendable.
            history.update(int(d) for d in dids[: max(1, len(dids) // 2)])
    # Followed single entities: the user read one doc mentioning each —
    # the 'Honda Civic' reader whose concept tags must extrapolate.
    for e in sorted(users.entities[user]):
        phrase = world.ontology.entities[
            world.ontology.entities.entity_id == e
        ].iloc[0].phrase
        for _, d in world.docs[world.docs.gold_kind == "concept"].iterrows():
            if f" {phrase} " in f" {d.body} ":
                history.add(int(d.doc_id))  # just the first such doc
                break
    return history


def tags_by_doc_map(doc_tags: pd.DataFrame) -> dict[int, dict[str, set[str]]]:
    """doc_id -> tag_type -> tags, precomputed once per simulation."""
    out: dict[int, dict[str, set[str]]] = {}
    for _, r in doc_tags.iterrows():
        out.setdefault(int(r.doc_id), {}).setdefault(r.tag_type, set()).add(r.tag)
    return out


def user_tag_profile(world, user: int, users: SimUsers, doc_tags):
    """The user's tag set per tag type, derived from reading history.

    The online system accumulates a user's tags from the articles they
    engage with, so the profile lives in the *mined* tag space: the
    union of the history documents' mined tags, per type. ``doc_tags``
    may be the raw DataFrame or the ``tags_by_doc_map`` of it.
    """
    hist = user_history(world, user, users)
    by_doc = (
        tags_by_doc_map(doc_tags) if isinstance(doc_tags, pd.DataFrame) else doc_tags
    )
    profile: dict[str, set[str]] = {t: set() for t in ATTENTION_TAGS}
    for d in hist:
        for t, tags in by_doc.get(d, {}).items():
            profile[t].update(tags)
    return profile


def run_simulation(
    world,
    doc_tags: pd.DataFrame,   # doc_id, tag, tag_type
    *,
    n_users: int = 200,
    per_user: int = 8,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Simulate both strategies; return (strategy_ctr, per_tag_ctr).

    For each user and strategy, rank unread articles by the
    specificity-weighted number of shared tags (restricted to the
    strategy's tag types), recommend the top ``per_user``, and draw
    clicks from the latent relevance. Per-tag CTR attributes each
    impression to the tag type contributing most to its score.
    """
    rng = np.random.default_rng(seed)
    users = sample_users(world, n_users=n_users, seed=seed)
    docs = world.docs
    tags_by_doc = tags_by_doc_map(doc_tags)

    specificity = ["topic", "event", "entity", "concept", "category"]
    strat_rows, tag_rows = [], []
    for strategy, allowed in [
        ("baseline(category+entity)", BASELINE_TAGS),
        ("attention(all tags)", ATTENTION_TAGS),
    ]:
        impressions = clicks = 0
        per_tag: dict[str, list[int]] = {t: [] for t in ATTENTION_TAGS}
        for u in range(n_users):
            profile = user_tag_profile(world, u, users, tags_by_doc)
            hist = user_history(world, u, users)
            scored = []
            for _, d in docs.iterrows():
                if int(d.doc_id) in hist:
                    continue  # already read; recommend something new
                dt = tags_by_doc.get(int(d.doc_id), {})
                contrib = {
                    t: TYPE_WEIGHT[t] * len(dt[t] & profile[t])
                    for t in allowed
                    if dt.get(t) and (dt[t] & profile[t])
                }
                if not contrib:
                    continue
                score = sum(contrib.values())
                # Attribute the impression to the most specific matched
                # tag type (entity above concept, as in Fig. 7's order).
                top_type = next(t for t in specificity if t in contrib)
                scored.append((score, int(d.doc_id), top_type, d))
            scored.sort(key=lambda x: (-x[0], x[1]))
            # Feed mixing: fill slots round-robin across tag types (each
            # type's pool score-sorted), as production feeds diversify —
            # otherwise the most specific type would own every slot.
            pools: dict[str, list] = {}
            for item in scored:
                pools.setdefault(item[2], []).append(item)
            mixed = []
            while len(mixed) < per_user and any(pools.values()):
                for t in specificity:
                    if pools.get(t):
                        mixed.append(pools[t].pop(0))
                        if len(mixed) >= per_user:
                            break
            for score, doc_id, top_type, d in mixed:
                rel = latent_relation(world, u, users, d)
                p = CLICK_PROBS[rel]
                clicked = int(rng.random() < p)
                impressions += 1
                clicks += clicked
                per_tag[top_type].append(clicked)
        strat_rows.append(
            {
                "strategy": strategy,
                "impressions": impressions,
                "CTR": clicks / impressions if impressions else float("nan"),
            }
        )
        if strategy == "attention(all tags)":
            for t in ATTENTION_TAGS:
                obs = per_tag[t]
                tag_rows.append(
                    {
                        "tag_type": t,
                        "impressions": len(obs),
                        "CTR": float(np.mean(obs)) if obs else float("nan"),
                    }
                )
    return pd.DataFrame(strat_rows), pd.DataFrame(tag_rows)


def assemble_doc_tags(
    world,
    concept_tags: pd.DataFrame,  # doc_id, tag (mined concept tagging)
    event_tags: pd.DataFrame,    # doc_id, tag (mined event tagging)
    ao_edges: pd.DataFrame,
) -> pd.DataFrame:
    """All tag rows (doc_id, tag, tag_type) for the simulation.

    Category and entity tags come from the document metadata / mention
    pipeline (the 'traditional' tags); concept/event tags from our
    taggers; topic tags propagate along mined topic->event isA edges.
    """
    rows = []
    for _, d in world.docs.iterrows():
        rows.append({"doc_id": int(d.doc_id), "tag": d.category, "tag_type": "category"})
    for _, r in concept_tags.iterrows():
        rows.append({"doc_id": int(r.doc_id), "tag": r.tag, "tag_type": "concept"})
    topic_of_event = {
        r.dst: r.src
        for r in ao_edges.itertuples()
        if r.type == "isA" and r.src_kind == "topic" and r.dst_kind == "event"
    }
    for _, r in event_tags.iterrows():
        rows.append({"doc_id": int(r.doc_id), "tag": r.tag, "tag_type": "event"})
        t = topic_of_event.get(r.tag)
        if t:
            rows.append({"doc_id": int(r.doc_id), "tag": t, "tag_type": "topic"})
    ce = ao_edges[
        (ao_edges.type == "isA")
        & (ao_edges.src_kind == "concept")
        & (ao_edges.dst_kind == "entity")
    ]
    ent_docs = []
    body_map = dict(zip(world.docs.doc_id, world.docs.body))
    for e in sorted(set(ce.dst)):
        for doc_id, body in body_map.items():
            if f" {e} " in f" {body} ":
                ent_docs.append((int(doc_id), e))
    for doc_id, e in ent_docs:
        rows.append({"doc_id": doc_id, "tag": e, "tag_type": "entity"})
    return pd.DataFrame(rows).drop_duplicates().reset_index(drop=True)
