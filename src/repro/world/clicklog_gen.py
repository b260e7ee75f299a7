"""Synthesize a search click log from the gold ontology.

For every gold attention (concept or event) we emit a family of noisy
queries and clicked documents with Zipf-skewed click counts, plus noise
documents, off-target noise clicks, entity queries, and user sessions
containing consecutive (concept query, entity query) pairs — the exact
signals GIANT's stages consume:

- random-walk clustering needs query-doc click counts;
- GCTSP-Net needs queries/titles where gold phrase tokens recur, with
  insertions, deletions and (for titles) filler prefixes/suffixes;
- the concept-entity classifier (paper Fig. 4) needs consecutive-query
  sessions and entity mentions in clicked-document bodies;
- correlate mining needs entity co-occurrence in queries and bodies;
- CSD/CPD need many concepts sharing suffixes and events sharing
  (trigger, object) patterns — guaranteed by ``ontology_gen``.

All frames are pandas (the worlds are MB-scale); ``to_spark`` lifts
them to DataFrames for the distributed pipeline.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.world import vocab
from repro.world.ontology_gen import Ontology, WorldConfig, generate_ontology


@dataclass
class World:
    """Gold ontology + synthesized click log."""

    ontology: Ontology
    queries: pd.DataFrame   # qid, text, gold_kind, gold_id
    docs: pd.DataFrame      # doc_id, title, body, category, publish_date, gold_kind, gold_id
    clicks: pd.DataFrame    # qid, doc_id, count
    sessions: pd.DataFrame  # user_id, session_id, step, qid

    @property
    def config(self) -> WorldConfig:
        return self.ontology.config


def _concept_queries(tokens: list[str], rng: np.random.Generator) -> list[list[str]]:
    """Query variants for a concept phrase (descending typicality).

    70% of concepts have the exact phrase as their primary query; the
    other 30% lead with a *partial* query (modifier dropped), so the
    full phrase is not contained in any single query — the regime where
    single-query methods (Q-LSTM-CRF, Align's first alignment) lose to
    GCTSP-Net's whole-cluster view, as in Table 5. A filler-suffixed
    variant appears for ~40% of concepts (Match's pattern fodder).
    """
    filler = vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
    exact_primary = rng.random() < 0.7
    variants = [tokens if exact_primary else tokens[1:]]
    if rng.random() < 0.4:
        variants.append(tokens + [filler])
    variants.append(["what", "are", "the"] + tokens)
    if exact_primary and len(tokens) > 1:
        variants.append(tokens[1:])
    return variants


def _concept_titles(
    tokens: list[str], onto: Ontology, concept_id: int, rng: np.random.Generator
) -> list[list[str]]:
    """Title variants for a concept's clicked docs, three top-title modes:

    - ~45%: clean verbatim-phrase title on top (query-title alignment
      succeeds exactly, the paper's common case);
    - ~30%: a comparison title leads — the phrase plus *another
      concept's* phrase ("rapid film vs luxury suv compared"). Cluster
      context (the other concept never occurs in the queries) is what
      disambiguates, which is exactly the argument for mining at the
      cluster level rather than per title;
    - ~25%: a title with an extra modifier prepended to the phrase
      ("luxury rapid film") leads — ambiguous by token identity alone,
      since the inserted modifier is a legitimate concept modifier
      elsewhere in the corpus.
    """
    filler = vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
    others = [m for m in vocab.MODIFIERS if m != tokens[0]]
    insert = others[int(rng.integers(len(others)))]
    me = onto.concepts[onto.concepts.concept_id == concept_id].iloc[0]
    # Comparison partner from a *different* suffix family: a listicle
    # compares different kinds of things; a same-suffix partner ("cozy
    # runner vs golden runner") would merge into one token chain in the
    # QTIG and make the partner's modifier irrecoverably ambiguous.
    other = onto.concepts[onto.concepts.suffix_id != me.suffix_id]
    other_toks = (
        other.iloc[int(rng.integers(len(other)))].phrase.split()
        if len(other)
        else ["misc"]
    )
    t_clean = [filler] + tokens
    t_rank = ["the"] + tokens + ["ranked"]
    t_ins = [insert] + tokens                     # extra modifier up front
    # Listicle-style comparison title: no delimiter separates the gold
    # concept from the other one — only the queries can tell them apart.
    t_cmp = (
        tokens + other_toks + [filler]
        if rng.random() < 0.5
        else other_toks + tokens + [filler]
    )
    t_part = tokens[1:] + ["guide"]               # modifier dropped
    r = rng.random()
    if r < 0.45:
        return [t_clean, t_rank, t_ins, t_part, t_cmp]
    if r < 0.75:
        return [t_cmp, t_rank, t_clean, t_part, t_ins]
    return [t_ins, t_rank, t_clean, t_part, t_cmp]


def _event_queries(ev: pd.Series, rng: np.random.Generator) -> list[list[str]]:
    """Event query variants; 50% of events get the exact phrase query.

    The year always appears in some variant so that multi-input models
    can reconstruct the full gold phrase even when no single title
    carries it.
    """
    toks = ev.phrase.split()
    ent = toks[:2]
    variants = []
    if rng.random() < 0.5:
        variants.append(toks)
    variants.append(ent + [ev.trigger])
    variants.append([ev.trigger, ev.object, ev.year])
    variants.append(ent + [ev.object, ev.year])
    return variants


def _event_titles(
    ev: pd.Series, onto: Ontology, rng: np.random.Generator
) -> list[list[str]]:
    """Event title variants, three difficulty levers (Tables 6-7):

    - ~50% of events have the exact phrase as a leading subtitle
      (CoverRank's success case); of those, 40% carry an adverb inserted
      inside the span ("<entity> officially <trigger> ..."), breaking
      verbatim extraction while keeping token coverage.
    - Otherwise all subtitles are partial: the gold phrase exists only
      token-wise across inputs (location rides in a 'report:' title),
      the regime where single-sequence baselines top out.
    - A confounder title mentions a *related but uninvolved* entity
      (and a wrong location): the paper's "unimportant elements" that
      annotators would strike out, and the main source of key-element
      false positives for per-sequence taggers.
    """
    toks = ev.phrase.split()
    base = toks[:2] + [ev.trigger, ev.object]
    filler = vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
    siblings = onto.entities[
        (onto.entities.cat_id == ev.cat_id) & (onto.entities.entity_id != ev.entity_id)
    ]
    other_ent = (
        siblings.iloc[int(rng.integers(len(siblings)))].phrase.split()
        if len(siblings)
        else ["someone"]
    )
    other_loc = vocab.LOCATIONS[int(rng.integers(len(vocab.LOCATIONS)))]
    other_trigs = [t for t in vocab.TRIGGERS if t != ev.trigger]
    trig2 = other_trigs[int(rng.integers(len(other_trigs)))]
    other_objs = [o for o in vocab.ALL_OBJECTS if o != ev.object]
    obj2 = sorted(other_objs)[int(rng.integers(len(other_objs)))]
    # The confounder is a full event-shaped snippet about a *sibling*
    # entity — indistinguishable from the gold elements at the token
    # level; only the cluster (queries + repeated titles) disambiguates.
    t_conf = other_ent + [trig2, obj2] + (
        [other_loc] if rng.random() < 0.5 else []
    ) + [";", filler]
    t_loc = ["report", ":"] + base + ([ev.location] if ev.location else []) + [";", "weekly"]
    t_part = base + [";", filler]
    if rng.random() < 0.5:
        full = list(toks)
        if rng.random() < 0.4:
            adv = vocab.ADVERBS[int(rng.integers(len(vocab.ADVERBS)))]
            full = toks[:2] + [adv] + toks[2:]  # adverb inside the span
        return [
            full + [";", filler, "news"],
            ["breaking", ":"] + base + [";", "report"],
            t_part,
            t_conf,
        ]
    return [t_part, t_loc, ["breaking", ":"] + base + [";", "report"], t_conf]


def _doc_body_concept(
    onto: Ontology, concept_id: int, rng: np.random.Generator
) -> str:
    """Body sentences mentioning member entities (classifier/correlate fuel).

    Each doc mentions a *rotating* subset of the concept's entities, so
    different docs about one concept cover different instances — which
    is what lets concept tags retrieve genuinely new entities for a
    user in the recommendation simulation (§5.4).
    """
    c = onto.concepts[onto.concepts.concept_id == concept_id].iloc[0]
    suffix = onto.parents[onto.parents.suffix_id == c.suffix_id].iloc[0].phrase
    members = onto.concept_entity[onto.concept_entity.concept_id == concept_id]
    all_ids = members.entity_id.tolist()
    k = min(3, len(all_ids))
    start = int(rng.integers(max(1, len(all_ids))))
    picked = [all_ids[(start + i) % len(all_ids)] for i in range(k)] if all_ids else []
    ents = [
        onto.entities[onto.entities.entity_id == e].iloc[0].phrase for e in picked
    ]
    sents: list[str] = []
    if ents:
        sents.append(f"{ents[0]} is a {suffix} .")
    if len(ents) >= 2:
        sents.append(f"{ents[1]} and {ents[0]} are {c.phrase} .")
    if len(ents) >= 3:
        sents.append(f"{ents[2]} is a {c.phrase} .")
    filler = vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
    sents.append(f"this {filler} covers the {suffix} .")
    return " ".join(sents)


def _doc_body_event(onto: Ontology, ev: pd.Series, rng: np.random.Generator) -> str:
    ent = onto.entities[onto.entities.entity_id == ev.entity_id].iloc[0].phrase
    sents = [f"{ent} {ev.trigger} the {ev.object} ."]
    if ev.location:
        sents.append(f"the {ev.object} was in {ev.location} .")
    if ev.year:
        sents.append(f"it happened in {ev.year} .")
    filler = vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
    sents.append(f"read the full {filler} .")
    return " ".join(sents)


def generate_world(cfg: WorldConfig | None = None) -> World:
    """Generate the full synthetic world for ``cfg`` (deterministic)."""
    cfg = cfg or WorldConfig()
    onto = generate_ontology(cfg)
    rng = np.random.default_rng(cfg.seed + 1)
    cat_names = onto.categories.set_index("cat_id")["name"].to_dict()

    q_rows, d_rows, c_rows = [], [], []
    qid = 0
    doc_id = 0

    def add_attention(kind: str, gid: int, cat: str, queries, titles, body_fn, date):
        nonlocal qid, doc_id
        my_qids, my_docs = [], []
        for i, qt in enumerate(queries):
            q_rows.append(
                {"qid": qid, "text": " ".join(qt), "gold_kind": kind, "gold_id": gid}
            )
            my_qids.append((qid, 1.0 / (1 + i)))
            qid += 1
        n_docs = min(cfg.docs_per_attention, len(titles))
        for j in range(n_docs):
            # Category noise: 5% of docs get a wrong category label.
            # With only ~4 docs per attention, a higher rate lets one
            # mislabeled popular doc carry > delta_q of the click mass
            # by itself (real click logs amortize this over thousands
            # of docs).
            cat_j = cat
            if rng.random() < 0.05:
                cat_j = cat_names[int(rng.integers(len(cat_names)))]
            d_rows.append(
                {
                    "doc_id": doc_id,
                    "title": " ".join(titles[j]),
                    "body": body_fn(),
                    "category": cat_j,
                    "publish_date": date,
                    "gold_kind": kind,
                    "gold_id": gid,
                }
            )
            my_docs.append((doc_id, 1.0 / (1 + j)))
            doc_id += 1
        # Zipf-ish click counts: popularity base per attention.
        base = int(rng.integers(20, 80))
        for q, wq in my_qids:
            for d, wd in my_docs:
                cnt = max(1, int(round(base * wq * wd)))
                c_rows.append({"qid": q, "doc_id": d, "count": cnt})
        return my_qids, my_docs

    concept_queries: dict[int, int] = {}  # concept_id -> top qid (for sessions)
    concept_docs: dict[int, list[int]] = {}
    for _, c in onto.concepts.iterrows():
        toks = c.phrase.split()
        qs, ds = add_attention(
            "concept",
            int(c.concept_id),
            cat_names[int(c.cat_id)],
            _concept_queries(toks, rng),
            _concept_titles(toks, onto, int(c.concept_id), rng),
            lambda cid=int(c.concept_id): _doc_body_concept(onto, cid, rng),
            "2019-06-01",
        )
        concept_queries[int(c.concept_id)] = qs[0][0]
        concept_docs[int(c.concept_id)] = [d for d, _ in ds]

    for _, ev in onto.events.iterrows():
        add_attention(
            "event",
            int(ev.event_id),
            cat_names[int(ev.cat_id)],
            _event_queries(ev, rng),
            _event_titles(ev, onto, rng),
            lambda e=ev: _doc_body_event(onto, e, rng),
            ev.time,
        )

    # Entity queries: one per entity, clicking docs that mention it.
    entity_qids: dict[int, int] = {}
    body_by_doc = {r["doc_id"]: r["body"] for r in d_rows}
    for _, ent in onto.entities.iterrows():
        q_rows.append(
            {
                "qid": qid,
                "text": ent.phrase,
                "gold_kind": "entity",
                "gold_id": int(ent.entity_id),
            }
        )
        entity_qids[int(ent.entity_id)] = qid
        # Click concept docs whose body mentions the entity phrase.
        cids = onto.concept_entity[
            onto.concept_entity.entity_id == ent.entity_id
        ].concept_id
        hits = 0
        for cid in cids:
            for d in concept_docs.get(int(cid), []):
                if ent.phrase in body_by_doc[d]:
                    c_rows.append({"qid": qid, "doc_id": d, "count": int(rng.integers(3, 15))})
                    hits += 1
        if hits == 0 and len(cids):
            d = concept_docs[int(cids.iloc[0])][0]
            c_rows.append({"qid": qid, "doc_id": d, "count": 3})
        qid += 1

    # Noise docs: filler-token titles, random category, no gold.
    for _ in range(cfg.n_noise_docs):
        toks = [
            vocab.FILLERS[int(rng.integers(len(vocab.FILLERS)))]
            for _ in range(int(rng.integers(3, 7)))
        ]
        d_rows.append(
            {
                "doc_id": doc_id,
                "title": " ".join(toks),
                "body": " ".join(toks) + " .",
                "category": cat_names[int(rng.integers(len(cat_names)))],
                "publish_date": "2019-01-01",
                "gold_kind": None,
                "gold_id": None,
            }
        )
        doc_id += 1

    # Noise clicks: a few random query->doc edges with count 1.
    n_noise_clicks = int(cfg.noise_click_prob * len(c_rows))
    for _ in range(n_noise_clicks):
        c_rows.append(
            {
                "qid": int(rng.integers(qid)),
                "doc_id": int(rng.integers(doc_id)),
                "count": 1,
            }
        )

    # Sessions: consecutive (concept query, member-entity query) pairs —
    # the positive signal of paper Fig. 4 — plus random noise sessions.
    s_rows = []
    session_id = 0
    ce = onto.concept_entity
    for u in range(cfg.n_users):
        for _ in range(cfg.sessions_per_user):
            if rng.random() < 0.75 and len(ce):
                row = ce.iloc[int(rng.integers(len(ce)))]
                steps = [
                    concept_queries[int(row.concept_id)],
                    entity_qids[int(row.entity_id)],
                ]
            else:
                steps = [int(rng.integers(qid)), int(rng.integers(qid))]
            for k, q in enumerate(steps):
                s_rows.append(
                    {"user_id": u, "session_id": session_id, "step": k, "qid": q}
                )
            session_id += 1

    clicks = (
        pd.DataFrame(c_rows)
        .groupby(["qid", "doc_id"], as_index=False)["count"]
        .sum()
    )
    return World(
        ontology=onto,
        queries=pd.DataFrame(q_rows),
        docs=pd.DataFrame(d_rows),
        clicks=clicks,
        sessions=pd.DataFrame(s_rows),
    )


def to_spark(spark: SparkSession, world: World) -> dict[str, DataFrame]:
    """Lift the click-log frames into Spark DataFrames.

    Gold columns ride along (they are only read by evaluation code, never
    by the mining pipeline itself).
    """
    docs = world.docs.copy()
    docs["gold_kind"] = docs["gold_kind"].astype(object).where(docs.gold_kind.notna(), None)
    docs["gold_id"] = docs["gold_id"].astype("float64")
    return {
        "queries": spark.createDataFrame(world.queries),
        "docs": spark.createDataFrame(docs),
        "clicks": spark.createDataFrame(world.clicks),
        "sessions": spark.createDataFrame(world.sessions),
    }
