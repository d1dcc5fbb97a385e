"""Row-matching quality metrics (Table 1: P, R, F1 vs the golden pairs)."""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Set, Tuple

Pair = Tuple[int, int]


@dataclass(frozen=True)
class MatchMetrics:
    precision: float
    recall: float
    f1: float
    n_pairs: int


def score_matching(candidates: Iterable[Pair], golden: Iterable[Pair]) -> MatchMetrics:
    """Precision/recall/F1 of candidate pairs against the golden pairs."""
    cand: Set[Pair] = set(candidates)
    gold: Set[Pair] = set(golden)
    tp = len(cand & gold)
    precision = tp / len(cand) if cand else 0.0
    recall = tp / len(gold) if gold else 0.0
    f1 = (
        2 * precision * recall / (precision + recall)
        if precision + recall > 0
        else 0.0
    )
    return MatchMetrics(precision, recall, f1, len(cand))
