"""Sequence-tagging baselines: the LSTM-CRF / LSTM substitutes.

The paper's LSTM-CRF baselines are BiLSTM encoders with (or, for
"LSTM", without) a CRF decoding layer. Without torch we substitute a
feature-rich *averaged structured perceptron* (DESIGN.md §2): emission
features over token identity/POS/NER/context/position, plus first-order
transition features when ``use_transitions=True`` (the CRF analogue;
switching transitions off gives the per-token "LSTM" analogue). The
supervised-sequence-tagger role and the CRF-vs-softmax contrast of
Tables 5-7 are preserved.
"""
from __future__ import annotations

from collections import defaultdict

from repro.nlp.tagger import ner_tag, pos_tag
from repro.nlp.tokenize import is_stop, tokenize


def token_features(tokens: list[str], i: int) -> list[str]:
    """Emission feature strings for position ``i``."""
    pos = pos_tag(tokens)
    ner = ner_tag(tokens)
    t = tokens[i]
    feats = [
        f"w={t}",
        f"pos={pos[i]}",
        f"ner={ner[i]}",
        f"stop={is_stop(t)}",
        f"len={min(len(t), 9)}",
        f"first={i == 0}",
        f"last={i == len(tokens) - 1}",
        f"prev_w={tokens[i - 1] if i > 0 else '<s>'}",
        f"next_w={tokens[i + 1] if i < len(tokens) - 1 else '</s>'}",
        f"prev_pos={pos[i - 1] if i > 0 else '<s>'}",
        f"next_pos={pos[i + 1] if i < len(tokens) - 1 else '</s>'}",
        f"pos_bigram={pos[i - 1] if i > 0 else '<s>'}|{pos[i]}",
    ]
    return feats


class PerceptronTagger:
    """Averaged structured perceptron with optional transition features."""

    def __init__(
        self, tags: list[str], *, use_transitions: bool = True, epochs: int = 5, seed: int = 0
    ) -> None:
        self.tags = list(tags)
        self.use_transitions = use_transitions
        self.epochs = epochs
        self.seed = seed
        self.w: dict[tuple[str, str], float] = defaultdict(float)
        self.trans: dict[tuple[str, str], float] = defaultdict(float)
        self._w_sum: dict[tuple[str, str], float] = defaultdict(float)
        self._t_sum: dict[tuple[str, str], float] = defaultdict(float)
        self._steps = 0

    # ------------------------------------------------------------- decode
    def _emissions(self, tokens: list[str]) -> list[dict[str, float]]:
        out = []
        for i in range(len(tokens)):
            feats = token_features(tokens, i)
            out.append(
                {tag: sum(self.w[(f, tag)] for f in feats) for tag in self.tags}
            )
        return out

    def predict(self, tokens: list[str]) -> list[str]:
        """Viterbi (with transitions) or per-token argmax tagging."""
        if not tokens:
            return []
        em = self._emissions(tokens)
        if not self.use_transitions:
            return [max(self.tags, key=lambda tg: (em[i][tg], tg)) for i in range(len(tokens))]
        n = len(tokens)
        delta = [{tg: em[0][tg] + self.trans[("<s>", tg)] for tg in self.tags}]
        back: list[dict[str, str]] = [{}]
        for i in range(1, n):
            row: dict[str, float] = {}
            bp: dict[str, str] = {}
            for tg in self.tags:
                best_prev = max(
                    self.tags,
                    key=lambda p: (delta[i - 1][p] + self.trans[(p, tg)], p),
                )
                row[tg] = delta[i - 1][best_prev] + self.trans[(best_prev, tg)] + em[i][tg]
                bp[tg] = best_prev
            delta.append(row)
            back.append(bp)
        last = max(self.tags, key=lambda tg: (delta[-1][tg] + self.trans[(tg, "</s>")], tg))
        path = [last]
        for i in range(n - 1, 0, -1):
            path.append(back[i][path[-1]])
        return path[::-1]

    # -------------------------------------------------------------- train
    def _update(self, tokens: list[str], gold: list[str], pred: list[str]) -> None:
        prev_g = prev_p = "<s>"
        for i, (g, p) in enumerate(zip(gold, pred)):
            if g != p:
                for f in token_features(tokens, i):
                    self.w[(f, g)] += 1.0
                    self.w[(f, p)] -= 1.0
            if self.use_transitions:
                if (prev_g, g) != (prev_p, p):
                    self.trans[(prev_g, g)] += 1.0
                    self.trans[(prev_p, p)] -= 1.0
                prev_g, prev_p = g, p
        if self.use_transitions:
            if gold and gold[-1] != pred[-1]:
                self.trans[(gold[-1], "</s>")] += 1.0
                self.trans[(pred[-1], "</s>")] -= 1.0

    def fit(self, sequences: list[list[str]], labels: list[list[str]]) -> "PerceptronTagger":
        import numpy as np

        rng = np.random.default_rng(self.seed)
        idx = np.arange(len(sequences))
        for _ in range(self.epochs):
            rng.shuffle(idx)
            for i in idx:
                toks, gold = sequences[i], labels[i]
                pred = self.predict(toks)
                self._update(toks, gold, pred)
                self._steps += 1
                for k, v in self.w.items():
                    self._w_sum[k] += v
                for k, v in self.trans.items():
                    self._t_sum[k] += v
        # Averaged weights (reduces overfitting vs the last update).
        if self._steps:
            self.w = defaultdict(
                float, {k: v / self._steps for k, v in self._w_sum.items()}
            )
            self.trans = defaultdict(
                float, {k: v / self._steps for k, v in self._t_sum.items()}
            )
        return self


# --------------------------------------------------------------------------
# Phrase-mining wrappers (Tables 5-6)
# --------------------------------------------------------------------------
PHRASE_TAGS = ["O", "P"]


def phrase_labels(tokens: list[str], gold: str) -> list[str]:
    gold_set = set(gold.split())
    return ["P" if t in gold_set else "O" for t in tokens]


def train_query_tagger(
    examples, *, field: str = "queries", epochs: int = 5, use_transitions: bool = True
) -> PerceptronTagger:
    """Train on the top query (LSTM-CRF-Q) or top title (LSTM-CRF-T)."""
    seqs, labs = [], []
    for _, r in examples.iterrows():
        text = r[field][0] if len(r[field]) else ""
        toks = tokenize(text)
        if toks:
            seqs.append(toks)
            labs.append(phrase_labels(toks, r["gold"]))
    return PerceptronTagger(PHRASE_TAGS, use_transitions=use_transitions, epochs=epochs).fit(
        seqs, labs
    )


def tag_phrase(tagger: PerceptronTagger, text: str) -> str:
    toks = tokenize(text)
    tags = tagger.predict(toks)
    return " ".join(t for t, tg in zip(toks, tags) if tg == "P")


def train_title_tagger_all(examples, *, epochs: int = 5) -> PerceptronTagger:
    """Event LSTM-CRF: trained on every title of every training example."""
    seqs, labs = [], []
    for _, r in examples.iterrows():
        for title in r["titles"]:
            toks = tokenize(title)
            if toks:
                seqs.append(toks)
                labs.append(phrase_labels(toks, r["gold"]))
    return PerceptronTagger(PHRASE_TAGS, use_transitions=True, epochs=epochs).fit(seqs, labs)


def extract_event_lstm_crf(
    tagger: PerceptronTagger, titles: list[str], *, len_min: int = 3, len_max: int = 10
) -> str:
    """Paper protocol: tag each title, filter by length, prefer the
    phrase from the top-clicked title."""
    for title in titles:
        phrase = tag_phrase(tagger, title)
        n = len(phrase.split())
        if len_min <= n <= len_max:
            return phrase
    return ""


# --------------------------------------------------------------------------
# Key-element wrappers (Table 7)
# --------------------------------------------------------------------------
ELEMENT_TAGS = ["other", "entity", "trigger", "location"]


def element_label_of(token: str, r) -> str:
    if token in set(r["entity_toks"]):
        return "entity"
    if token in set(r["trigger_toks"]):
        return "trigger"
    if token in set(r["location_toks"]):
        return "location"
    return "other"


def train_element_tagger(
    examples, *, epochs: int = 5, use_transitions: bool = True
) -> PerceptronTagger:
    """4-class tagger trained on every query and title sequence of each
    event example (sequences are fed individually, as in the paper)."""
    seqs, labs = [], []
    for _, r in examples.iterrows():
        for text in list(r["queries"]) + list(r["titles"]):
            toks = tokenize(text)
            if toks:
                seqs.append(toks)
                labs.append([element_label_of(t, r) for t in toks])
    return PerceptronTagger(
        ELEMENT_TAGS, use_transitions=use_transitions, epochs=epochs
    ).fit(seqs, labs)
