"""Solution compilation: top-k coverage and greedy minimal cover (§4.1.6).

Finding a minimal covering set of transformations is set cover
(NP-complete); the greedy algorithm — repeatedly pick the transformation
covering the most yet-uncovered rows — achieves the classic H(n) ≈
ln(n)+1 approximation ratio.
"""
from __future__ import annotations

from typing import List, Sequence, Set, Tuple

from .units import Transformation


def top_k_by_coverage(
    transformations: Sequence[Transformation],
    covers: Sequence[Set[int]],
    k: int = 1,
    *,
    exclude_pure_literals: bool = False,
) -> List[Tuple[Transformation, Set[int]]]:
    """The k transformations with the largest cover sets.

    Ties break toward fewer placeholders then toward the earlier
    candidate, making results deterministic. ``exclude_pure_literals``
    drops transformations that are constants (they trivially cover the
    single row they were generated from and carry no mapping signal).
    """
    ranked = sorted(
        (
            (t, c)
            for t, c in zip(transformations, covers)
            if not (exclude_pure_literals and t.is_pure_literal())
        ),
        key=lambda tc: (-len(tc[1]), tc[0].n_placeholders, len(tc[0].units)),
    )
    return ranked[:k]


def greedy_min_cover(
    transformations: Sequence[Transformation],
    covers: Sequence[Set[int]],
    n_rows: int,
    *,
    min_support: int = 0,
    exclude_pure_literals: bool = False,
) -> List[Tuple[Transformation, Set[int]]]:
    """Greedy set cover over the input rows.

    ``min_support`` drops transformations covering fewer rows than the
    threshold before the greedy pass — the paper uses a 1% support
    threshold on its noisy Open-data input (§6.4). Stops when no
    remaining transformation adds coverage.
    """
    candidates = [
        (t, c)
        for t, c in zip(transformations, covers)
        if len(c) >= max(min_support, 1)
        and not (exclude_pure_literals and t.is_pure_literal())
    ]
    uncovered: Set[int] = set(range(n_rows))
    solution: List[Tuple[Transformation, Set[int]]] = []
    while uncovered and candidates:
        best_i, best_gain = -1, 0
        for i, (t, c) in enumerate(candidates):
            gain = len(c & uncovered)
            if gain > best_gain or (
                gain == best_gain
                and gain > 0
                and best_i != -1
                and _tie_break(candidates[i], candidates[best_i])
            ):
                best_i, best_gain = i, gain
        if best_gain == 0:
            break
        t, c = candidates.pop(best_i)
        solution.append((t, c))
        uncovered -= c
    return solution


def _tie_break(a, b) -> bool:
    """Prefer larger total coverage, then shorter transformations."""
    (ta, ca), (tb, cb) = a, b
    return (-len(ca), ta.n_placeholders, len(ta.units)) < (
        -len(cb),
        tb.n_placeholders,
        len(tb.units),
    )
