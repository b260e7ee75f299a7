"""Evaluation metrics (paper §5.2).

Phrase mining: Exact Match, SQuAD-style token F1, coverage (fraction of
non-empty predictions). EM and F1 average over *all* examples — an
empty prediction scores 0 — which is the reading under which the
paper's numbers are internally consistent (Match: COV 0.36 upper-bounds
its EM 0.149 and F1 0.305; every method's EM ≤ COV in Tables 5-6).

Key-element recognition: per-token 4-class F1 macro / micro / weighted
computed from a confusion matrix, sklearn-compatible definitions.
"""
from __future__ import annotations

from collections import Counter

import numpy as np


def exact_match(pred: str, gold: str) -> float:
    """1.0 iff the token sequences are identical."""
    return float(pred.split() == gold.split())


def token_f1(pred: str, gold: str) -> float:
    """Multiset token overlap F1 between prediction and gold."""
    p, g = pred.split(), gold.split()
    if not p or not g:
        return float(p == g)
    common = sum((Counter(p) & Counter(g)).values())
    if common == 0:
        return 0.0
    precision = common / len(p)
    recall = common / len(g)
    return 2 * precision * recall / (precision + recall)


def phrase_metrics(preds: list[str], golds: list[str]) -> dict[str, float]:
    """EM / F1 over all examples (empty pred scores 0) + COV."""
    assert len(preds) == len(golds)
    if not preds:
        return {"EM": 0.0, "F1": 0.0, "COV": 0.0}
    cov = sum(1 for p in preds if p.strip()) / len(preds)
    em = float(
        np.mean([exact_match(p, g) if p.strip() else 0.0 for p, g in zip(preds, golds)])
    )
    f1 = float(
        np.mean([token_f1(p, g) if p.strip() else 0.0 for p, g in zip(preds, golds)])
    )
    return {"EM": em, "F1": f1, "COV": cov}


def multiclass_f1(
    y_true: list[int], y_pred: list[int], n_classes: int
) -> dict[str, float]:
    """F1-macro / F1-micro / F1-weighted over token classifications.

    Classes absent from both truth and prediction contribute F1 = 0 to
    the macro average (sklearn's zero_division=0 behaviour).
    """
    assert len(y_true) == len(y_pred)
    y_true_a = np.asarray(y_true)
    y_pred_a = np.asarray(y_pred)
    f1s, weights = [], []
    tp_all = fp_all = fn_all = 0
    for c in range(n_classes):
        tp = int(((y_true_a == c) & (y_pred_a == c)).sum())
        fp = int(((y_true_a != c) & (y_pred_a == c)).sum())
        fn = int(((y_true_a == c) & (y_pred_a != c)).sum())
        denom = 2 * tp + fp + fn
        f1s.append(2 * tp / denom if denom else 0.0)
        weights.append(int((y_true_a == c).sum()))
        tp_all += tp
        fp_all += fp
        fn_all += fn
    micro_denom = 2 * tp_all + fp_all + fn_all
    total_w = sum(weights)
    return {
        "F1-macro": float(np.mean(f1s)),
        "F1-micro": 2 * tp_all / micro_denom if micro_denom else 0.0,
        "F1-weighted": (
            float(sum(f * w for f, w in zip(f1s, weights)) / total_w)
            if total_w
            else 0.0
        ),
    }
