"""Attention Ontology assembly and evaluation (Tables 1-4).

``build_ontology`` runs the whole GIANT pipeline over a click log:

1. random-walk query-doc clustering (Spark);
2. distributed GCTSP-Net phrase mining over every cluster;
3. kind classification (phrases containing a trigger verb are events —
   the stand-in for the paper's separate concept/event pipelines);
4. attention phrase normalization -> attention nodes;
5. distributed key-element recognition for events;
6. CSD parent concepts, CPD topics;
7. linking: category isA (click co-occurrence), concept-entity isA
   (Fig.-4 classifier), involve (elements, topic-concept), correlate
   (entity embeddings).

Entity *inventory* is an input (the paper's entities come from existing
knowledge bases); every relationship to entities is mined, never read
from gold. ``evaluate_ontology`` then scores edge precision against the
generator's ground truth — our mechanical substitute for the paper's
three human judges (Table 2).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import linking
from repro.core.correlate import correlate_edges
from repro.core.derive import common_pattern_discovery, common_suffix_discovery
from repro.core.gctsp import predict_elements_spark, predict_phrases_spark
from repro.core.normalize import merge_phrases, node_table
from repro.core.random_walk import query_doc_clusters
from repro.nlp.tagger import pos_tag
from repro.nlp.textutil import contains_in_order
from repro.nlp.tokenize import tokenize
from repro.world import vocab
from repro.world.clicklog_gen import World

TRIGGER_SET = frozenset(vocab.TRIGGERS)


@dataclass
class AttentionOntology:
    """The assembled ontology: typed nodes, typed edges, memberships."""

    nodes: pd.DataFrame    # kind, phrase
    edges: pd.DataFrame    # src_kind, src, dst_kind, dst, type, score
    members: pd.DataFrame  # node_phrase, kind, seed_qids (list[int])

    def node_counts(self) -> pd.DataFrame:
        """Table-1-shaped node counts per kind."""
        return (
            self.nodes.groupby("kind")
            .size()
            .rename("count")
            .reset_index()
            .sort_values("kind")
            .reset_index(drop=True)
        )

    def edge_counts(self) -> pd.DataFrame:
        """Table-2-shaped edge counts per relationship type."""
        return (
            self.edges.groupby("type")
            .size()
            .rename("count")
            .reset_index()
            .sort_values("type")
            .reset_index(drop=True)
        )


def classify_kind(phrase: str) -> str:
    """'event' iff the mined phrase contains a trigger verb."""
    return "event" if any(t in TRIGGER_SET for t in phrase.split()) else "concept"


def mine_attention_nodes(
    spark: SparkSession,
    frames: dict[str, DataFrame],
    phrase_model,
    min_node_support: int = 2,
    **walk_kwargs,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Cluster + mine + normalize. Returns (node_table, merged_detail).

    Nodes backed by fewer than ``min_node_support`` clusters are
    dropped: a genuine attention is reached by several query variants,
    while a single-cluster phrase is usually a mining artifact (e.g. a
    gold phrase polluted by a comparison-title token). The paper
    applies the same idea when it filters derived phrases by user
    search support.
    """
    clusters = query_doc_clusters(
        frames["clicks"], frames["queries"], frames["docs"], **walk_kwargs
    ).cache()
    examples = clusters.select(
        F.col("seed_qid").alias("example_id"), "queries", "titles"
    )
    preds = predict_phrases_spark(examples, phrase_model)
    mined = (
        clusters.join(
            preds.select(F.col("example_id").alias("seed_qid"), "prediction"), "seed_qid"
        )
        .select("seed_qid", "prediction", "queries", "titles")
        .toPandas()
    )
    mined = mined[mined.prediction.str.len() > 0].reset_index(drop=True)
    mined["kind"] = mined.prediction.map(classify_kind)
    mined = mined.rename(columns={"prediction": "phrase"})
    # Attestation filter for concepts: a concept phrase must occur as an
    # in-order subsequence of at least one member query or title. A
    # cluster seeded by a multi-concept entity blends two concepts'
    # titles, and the blended phrase ("cozy runner golden") is attested
    # by none of them. Events are exempt — assembling an event phrase
    # across inputs is exactly what GCTSP-Net is for.
    keep_mask = []
    for _, r in mined.iterrows():
        if r.kind != "concept":
            keep_mask.append(True)
            continue
        toks = r.phrase.split()
        keep_mask.append(
            any(
                contains_in_order(toks, tokenize(text))
                for text in list(r.queries) + list(r.titles)
            )
        )
    mined = mined[keep_mask].reset_index(drop=True)
    merged = merge_phrases(mined[["seed_qid", "phrase", "kind", "titles"]])
    nodes = node_table(merged)
    keep = nodes[nodes.n_clusters >= min_node_support]
    kept_keys = set(zip(keep.node_phrase, keep.kind))
    merged = merged[
        [(p, k) in kept_keys for p, k in zip(merged.node_phrase, merged.kind)]
    ].reset_index(drop=True)
    return keep.reset_index(drop=True), merged


def _event_object(phrase: str, elements: dict[str, list[str]]) -> str | None:
    """The object noun of an event phrase: the first leftover NOUN after
    removing recognized elements, punctuation and time tokens."""
    consumed = set(elements.get("entity", [])) | set(elements.get("trigger", []))
    consumed |= set(elements.get("location", []))
    toks = phrase.split()
    tags = pos_tag(toks)
    seen_trigger = False
    for t, tag in zip(toks, tags):
        if t in consumed:
            if t in elements.get("trigger", []):
                seen_trigger = True
            continue
        if seen_trigger and tag in ("NOUN", "PROPN") and not t.isdigit():
            return t
    for t, tag in zip(toks, tags):
        if t not in consumed and tag in ("NOUN", "PROPN") and not t.isdigit():
            return t
    return None


def build_ontology(
    spark: SparkSession,
    frames: dict[str, DataFrame],
    entity_inventory: list[str],
    categories: list[str],
    phrase_model,
    element_model,
    *,
    correlate_tau: float = 0.7,
    min_node_support: int = 2,
    seed: int = 0,
    **walk_kwargs,
) -> AttentionOntology:
    """Run the full GIANT pipeline; see module docstring."""
    nodes, merged = mine_attention_nodes(
        spark, frames, phrase_model, min_node_support, **walk_kwargs
    )

    members_pdf = merged[["node_phrase", "kind", "seed_qid"]].rename(
        columns={"seed_qid": "qid"}
    )
    members = spark.createDataFrame(members_pdf)

    # ---------------------------------------------------------- elements
    event_nodes = nodes[nodes.kind == "event"].reset_index(drop=True)
    elements_by_event: dict[str, dict[str, list[str]]] = {}
    if len(event_nodes):
        ev_clusters = (
            members.where(F.col("kind") == "event")
            .groupBy("node_phrase")
            .agg(F.min("qid").alias("seed_qid"))
        )
        walk = query_doc_clusters(
            frames["clicks"], frames["queries"], frames["docs"], **walk_kwargs
        )
        ev_examples = (
            ev_clusters.join(walk, "seed_qid")
            .select(
                F.col("seed_qid").alias("example_id"),
                "node_phrase",
                "queries",
                "titles",
            )
        ).cache()
        elem = predict_elements_spark(
            ev_examples.select("example_id", "queries", "titles"), element_model
        )
        got = (
            ev_examples.select("example_id", "node_phrase")
            .join(elem, "example_id")
            .toPandas()
        )
        for _, r in got.iterrows():
            # Keep only element tokens that survive into the mined event
            # phrase itself: elements recognized from confounder titles
            # (sibling entities, wrong locations) are not part of the
            # event and would otherwise become wrong involve edges.
            in_phrase = set(r.node_phrase.split())
            elements_by_event[r.node_phrase] = {
                "entity": [t for t in r.entity_pred if t in in_phrase],
                "trigger": [t for t in r.trigger_pred if t in in_phrase],
                "location": [t for t in r.location_pred if t in in_phrase],
            }

    edges: list[dict] = []

    # --------------------------------------------------- involve (events)
    inventory = sorted(set(entity_inventory))
    ent_token_map: dict[str, str] = {}
    for e in inventory:
        for t in e.split():
            ent_token_map.setdefault(t, e)
    for ev_phrase, el in elements_by_event.items():
        matched_entities = {
            ent_token_map[t] for t in el["entity"] if t in ent_token_map
        }
        # Require both tokens of a 2-token entity to be plausible parts
        # of the phrase: keep entities whose full surface is a substring.
        for e in sorted(matched_entities):
            if all(t in ev_phrase.split() for t in e.split()):
                edges.append(
                    {
                        "src_kind": "event", "src": ev_phrase,
                        "dst_kind": "entity", "dst": e,
                        "type": "involve", "score": 1.0,
                    }
                )
        for t in sorted(set(el["trigger"])):
            edges.append(
                {
                    "src_kind": "event", "src": ev_phrase,
                    "dst_kind": "trigger", "dst": t,
                    "type": "involve", "score": 1.0,
                }
            )
        for t in sorted(set(el["location"])):
            edges.append(
                {
                    "src_kind": "event", "src": ev_phrase,
                    "dst_kind": "location", "dst": t,
                    "type": "involve", "score": 1.0,
                }
            )

    # ------------------------------------------------------ CSD (parents)
    concept_phrases = sorted(nodes[nodes.kind == "concept"].node_phrase)
    parents, parent_edges = common_suffix_discovery(spark, concept_phrases)
    for _, r in parent_edges.iterrows():
        edges.append(
            {
                "src_kind": "concept", "src": r.parent,
                "dst_kind": "concept", "dst": r.child,
                "type": "isA", "score": 1.0,
            }
        )

    # --------------------------------------------- concept-entity (Fig. 4)
    mentions = linking.entity_mentions(frames["docs"], inventory).cache()
    concept_members = members.where(F.col("kind") == "concept").select(
        "node_phrase", "qid"
    )
    cands = linking.candidate_pairs(concept_members, frames["clicks"], mentions)
    sess = linking.session_pairs(frames["sessions"], frames["queries"], concept_members)
    cands_pdf = (
        cands.join(sess, ["node_phrase", "entity_phrase"], "left")
        .fillna({"n_sessions": 0})
        .toPandas()
    )
    docs_pdf = frames["docs"].select("doc_id", "body", "category").toPandas()
    doc_bodies = dict(zip(docs_pdf.doc_id, docs_pdf.body))
    concept_doc_map: dict[str, list[int]] = {}
    cd = (
        concept_members.join(frames["clicks"], "qid")
        .select("node_phrase", "doc_id")
        .distinct()
        .toPandas()
    )
    for _, r in cd.iterrows():
        concept_doc_map.setdefault(r.node_phrase, []).append(int(r.doc_id))

    # ------------------------------------------------- category edges
    cat_edges = linking.category_edges(
        members.select("node_phrase", "qid"), frames["clicks"], frames["docs"]
    ).toPandas()
    kind_of = dict(zip(nodes.node_phrase, nodes.kind))
    for _, r in cat_edges.iterrows():
        edges.append(
            {
                "src_kind": "category", "src": r.category,
                "dst_kind": kind_of.get(r.node_phrase, "concept"),
                "dst": r.node_phrase,
                "type": "isA", "score": float(r.p_g_given_p),
            }
        )

    cat_of_concept = {
        r.dst: r.src
        for r in pd.DataFrame(edges).itertuples()
        if r.type == "isA" and r.src_kind == "category" and r.dst_kind == "concept"
    } if edges else {}
    entity_category: dict[str, str] = {}
    ent_mentions_cat = (
        mentions.join(frames["docs"].select("doc_id", "category"), "doc_id")
        .groupBy("entity_phrase", "category")
        .agg(F.count("*").alias("n"))
        .toPandas()
    )
    for e, grp in ent_mentions_cat.groupby("entity_phrase"):
        entity_category[e] = grp.sort_values(["n", "category"], ascending=[False, True]).iloc[0].category

    ce = linking.concept_entity_edges(
        cands_pdf, doc_bodies, concept_doc_map, entity_category, cat_of_concept,
        seed=seed,
    )
    for _, r in ce.iterrows():
        edges.append(
            {
                "src_kind": "concept", "src": r.node_phrase,
                "dst_kind": "entity", "dst": r.entity_phrase,
                "type": "isA", "score": float(r.score),
            }
        )

    # --------------------------------------------------------- CPD topics
    concept_of_entity: dict[str, str] = {}
    for _, r in ce.sort_values(["entity_phrase", "score"]).iterrows():
        cur = concept_of_entity.get(r.entity_phrase)
        # most fine-grained = longest phrase, then higher score
        if cur is None or len(r.node_phrase.split()) > len(cur.split()):
            concept_of_entity[r.entity_phrase] = r.node_phrase
    ev_rows = []
    for ev_phrase, el in elements_by_event.items():
        ent = next(
            (
                e
                for e in sorted(
                    {ent_token_map[t] for t in el["entity"] if t in ent_token_map}
                )
                if all(t in ev_phrase.split() for t in e.split())
            ),
            None,
        )
        trig = el["trigger"][0] if el["trigger"] else None
        obj = _event_object(ev_phrase, el)
        if ent and trig and obj:
            ev_rows.append(
                {
                    "phrase": ev_phrase,
                    "entity_phrase": ent,
                    "trigger": trig,
                    "object": obj,
                }
            )
    topics, topic_isa, topic_involve = common_pattern_discovery(
        pd.DataFrame(ev_rows, columns=["phrase", "entity_phrase", "trigger", "object"]),
        concept_of_entity,
    )
    for _, r in topic_isa.iterrows():
        edges.append(
            {
                "src_kind": "topic", "src": r.topic,
                "dst_kind": "event", "dst": r.event,
                "type": "isA", "score": 1.0,
            }
        )
    for _, r in topic_involve.iterrows():
        edges.append(
            {
                "src_kind": "topic", "src": r.topic,
                "dst_kind": "concept", "dst": r.concept,
                "type": "involve", "score": 1.0,
            }
        )

    # ---------------------------------------------------------- correlate
    corr = correlate_edges(
        mentions, frames["queries"], inventory, tau=correlate_tau, seed=seed
    )
    for _, r in corr.iterrows():
        edges.append(
            {
                "src_kind": "entity", "src": r.ea,
                "dst_kind": "entity", "dst": r.eb,
                "type": "correlate", "score": float(r.distance),
            }
        )

    # -------------------------------------------------------------- nodes
    node_rows = [{"kind": "category", "phrase": c} for c in sorted(categories)]
    node_rows += [
        {"kind": k, "phrase": p}
        for k, p in zip(nodes.kind, nodes.node_phrase)
    ]
    node_rows += [{"kind": "concept", "phrase": p} for p in parents.phrase]
    node_rows += [{"kind": "topic", "phrase": p} for p in topics.phrase]
    linked_entities = sorted(
        {
            e.dst
            for e in pd.DataFrame(edges).itertuples()
            if e.dst_kind == "entity"
        } | {
            e.src
            for e in pd.DataFrame(edges).itertuples()
            if e.src_kind == "entity"
        }
    ) if edges else []
    node_rows += [{"kind": "entity", "phrase": e} for e in linked_entities]
    nodes_df = (
        pd.DataFrame(node_rows)
        .drop_duplicates(subset=["kind", "phrase"])
        .sort_values(["kind", "phrase"])
        .reset_index(drop=True)
    )
    edges_df = (
        pd.DataFrame(
            edges,
            columns=["src_kind", "src", "dst_kind", "dst", "type", "score"],
        )
        .drop_duplicates(subset=["src_kind", "src", "dst_kind", "dst", "type"])
        .reset_index(drop=True)
    )
    members_out = (
        members_pdf.groupby(["node_phrase", "kind"])["qid"]
        .apply(lambda s: sorted(s))
        .rename("seed_qids")
        .reset_index()
    )
    return AttentionOntology(nodes=nodes_df, edges=edges_df, members=members_out)


# --------------------------------------------------------------------------
# Evaluation against the gold world (Table 2's human judges, mechanized)
# --------------------------------------------------------------------------
def _fuzzy_event_matcher(gold_phrases: list[str], *, min_jaccard: float = 0.7):
    """Map a mined event phrase to its gold event by token Jaccard.

    The paper's Table-2 accuracies come from human judges assessing the
    *semantics* of an edge; a mined phrase that drops a year or carries
    an adverb still denotes the same event. Exact-string matching would
    punish the phrasing rather than the relationship, so we take the
    best-overlap gold event above ``min_jaccard``.
    """
    gold_sets = [(p, set(p.split())) for p in gold_phrases]

    def match(phrase: str) -> str | None:
        toks = set(phrase.split())
        best, best_j = None, min_jaccard
        for p, s in gold_sets:
            j = len(toks & s) / max(1, len(toks | s))
            if j > best_j or (j == best_j and best is None and j >= min_jaccard):
                best, best_j = p, j
        return best

    return match


def evaluate_ontology(ao: AttentionOntology, world: World) -> pd.DataFrame:
    """Edge precision per relationship type vs the generator's gold."""
    o = world.ontology
    gold_concepts = dict(zip(o.concepts.phrase, o.concepts.concept_id))
    gold_parents = set(o.parents.phrase)
    parent_of = {
        r.phrase: o.parents[o.parents.suffix_id == r.suffix_id].iloc[0].phrase
        for _, r in o.concepts.iterrows()
    }
    gold_events = o.events.set_index("phrase")
    gold_topics = dict(zip(o.topics.phrase, o.topics.topic_id))
    match_event = _fuzzy_event_matcher(list(gold_events.index))
    match_topic = _fuzzy_event_matcher(list(o.topics.phrase))

    def resolve_event(p: str) -> str | None:
        return p if p in gold_events.index else match_event(p)

    def resolve_topic(p: str) -> str | None:
        return p if p in gold_topics else match_topic(p)
    cat_name = o.categories.set_index("cat_id")["name"].to_dict()
    entity_id_of = dict(zip(o.entities.phrase, o.entities.entity_id))
    gold_ce = {
        (int(r.concept_id), int(r.entity_id)) for _, r in o.concept_entity.iterrows()
    }
    gold_corr = o.gold_correlate_pairs()
    topic_concept = {
        o.topics.iloc[i].phrase: o.concepts[
            o.concepts.concept_id == o.topics.iloc[i].concept_id
        ].iloc[0].phrase
        for i in range(len(o.topics))
    }

    def concept_cat(phrase: str) -> str | None:
        cid = gold_concepts.get(phrase)
        if cid is not None:
            return cat_name[int(o.concepts[o.concepts.concept_id == cid].iloc[0].cat_id)]
        if phrase in gold_parents:
            return cat_name[int(o.parents[o.parents.phrase == phrase].iloc[0].cat_id)]
        return None

    def edge_correct(e) -> bool | None:
        """True/False judgment; None = endpoint unknown to gold (judged
        incorrect, conservatively)."""
        if e.type == "correlate":
            a, b = entity_id_of.get(e.src), entity_id_of.get(e.dst)
            if a is None or b is None:
                return False
            return (min(a, b), max(a, b)) in gold_corr
        if e.type == "involve":
            if e.src_kind == "event":
                src = resolve_event(e.src)
                if src is None:
                    return False
                ev = gold_events.loc[src]
                if e.dst_kind == "entity":
                    ent = o.entities[o.entities.entity_id == ev.entity_id]
                    return len(ent) > 0 and ent.iloc[0].phrase == e.dst
                if e.dst_kind == "trigger":
                    return e.dst == ev.trigger
                if e.dst_kind == "location":
                    return e.dst == ev.location
                return False
            if e.src_kind == "topic":
                # topic -> concept involve
                t = resolve_topic(e.src)
                gold_c = topic_concept.get(t) if t else None
                return gold_c is not None and e.dst == gold_c
            return False
        # isA
        if e.src_kind == "category":
            if e.dst_kind == "concept":
                c = concept_cat(e.dst)
                return c is not None and c == e.src
            if e.dst_kind == "event":
                dst = resolve_event(e.dst)
                if dst is None:
                    return False
                return cat_name[int(gold_events.loc[dst].cat_id)] == e.src
            return False
        if e.src_kind == "concept" and e.dst_kind == "concept":
            return parent_of.get(e.dst) == e.src
        if e.src_kind == "concept" and e.dst_kind == "entity":
            cid = gold_concepts.get(e.src)
            eid = entity_id_of.get(e.dst)
            if cid is None or eid is None:
                # parent concepts: correct if the entity belongs to any
                # child concept with this suffix
                if e.src in gold_parents and eid is not None:
                    kids = o.concepts[
                        o.concepts.suffix_id
                        == o.parents[o.parents.phrase == e.src].iloc[0].suffix_id
                    ]
                    return any(
                        (int(k), int(eid)) in gold_ce for k in kids.concept_id
                    )
                return False
            return (int(cid), int(eid)) in gold_ce
        if e.src_kind == "topic" and e.dst_kind == "event":
            dst = resolve_event(e.dst)
            t = resolve_topic(e.src)
            if dst is None or t is None:
                return False
            tid = gold_events.loc[dst].topic_id
            return tid is not None and not pd.isna(tid) and int(tid) == int(
                gold_topics[t]
            )
        return False

    rows = []
    for etype in ("isA", "correlate", "involve"):
        sub = ao.edges[ao.edges.type == etype]
        if not len(sub):
            rows.append({"type": etype, "count": 0, "accuracy": float("nan")})
            continue
        ok = sum(bool(edge_correct(e)) for e in sub.itertuples())
        rows.append(
            {"type": etype, "count": len(sub), "accuracy": ok / len(sub)}
        )
    return pd.DataFrame(rows)
