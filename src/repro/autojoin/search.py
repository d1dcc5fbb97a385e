"""Auto-Join baseline (Zhu, He, Chaudhuri — VLDB'17), as described in §3.2.

Given a small subset of row pairs that is assumed to be covered by a
*single* transformation, the search (1) enumerates every transformation
unit with every parameter combination, (2) keeps units whose output on
every source appears inside the corresponding remaining target, (3)
sorts them by the average target length covered, and (4) recursively
solves the remaining target text to the left and the right of the
matched span, backtracking to the next unit when a sub-problem fails.

This is a blind search over the u·l^z parameter space (paper §5.2) —
deliberately *not* using the placeholder evidence of the main approach.
A wall-clock/node budget makes it runnable: the paper itself caps
Auto-Join at 650,000 s and records the cap when exceeded.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import List, Optional, Sequence, Tuple

from repro.core.generate import ABSENT_DELIMITERS
from repro.core.units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    Transformation,
    TwoCharSplitSubstr,
    Unit,
)


@dataclass(frozen=True)
class AutoJoinConfig:
    """Search knobs. ``use_twochar`` mirrors the paper's §6.2 exclusion."""

    use_split: bool = True
    use_splitsubstr: bool = True
    use_twochar: bool = False
    max_depth: int = 6  # recursion depth ≈ number of units in the result
    time_limit_sec: float = 30.0
    # Unit applications before giving up; set high so the wall-clock cap
    # is the binding constraint (as in the paper), while still bounding
    # pathological recursions deterministically.
    node_budget: int = 20_000_000


class _Budget:
    """Shared wall-clock + node budget; raises to unwind the search."""

    def __init__(self, config: AutoJoinConfig):
        self.deadline = time.perf_counter() + config.time_limit_sec
        self.nodes = config.node_budget
        self.exhausted = False

    def charge(self, n: int = 1) -> bool:
        self.nodes -= n
        if self.nodes <= 0 or time.perf_counter() > self.deadline:
            self.exhausted = True
        return self.exhausted


def _enumerate_units(source: str, config: AutoJoinConfig) -> List[Unit]:
    """All unit/parameter combinations for one source string (blind)."""
    units: List[Unit] = []
    n = len(source)
    for s in range(n):
        for e in range(s + 1, n + 1):
            units.append(Substr(s, e))
    chars = list(dict.fromkeys(source))
    if config.use_split:
        for c in chars:
            for i in range(source.count(c) + 1):
                units.append(Split(c, i))
        for c in ABSENT_DELIMITERS:  # identity copy via absent delimiter
            if c not in source:
                units.append(Split(c, 0))
                break
    if config.use_splitsubstr:
        for c in chars:
            pieces = source.split(c)
            for i, piece in enumerate(pieces):
                for s in range(len(piece)):
                    for e in range(s + 1, len(piece) + 1):
                        units.append(SplitSubstr(c, i, s, e))
    if config.use_twochar:
        for c1 in chars:
            for c2 in chars:
                if c1 >= c2:
                    continue
                pieces = source.replace(c2, c1).split(c1)
                for i, piece in enumerate(pieces):
                    for s in range(len(piece)):
                        for e in range(s + 1, len(piece) + 1):
                            units.append(TwoCharSplitSubstr(c1, c2, i, s, e))
    return units


def _search(
    pairs: Sequence[Tuple[str, str]],
    config: AutoJoinConfig,
    budget: _Budget,
    depth: int,
) -> Optional[List[Unit]]:
    """Find a unit sequence mapping every src onto its (remaining) tgt."""
    if all(t == "" for _, t in pairs):
        return []
    if depth >= config.max_depth or budget.exhausted:
        return None

    # Literal candidate: all remaining targets identical and non-empty.
    tgts = [t for _, t in pairs]
    literal: Optional[Unit] = None
    if len(set(tgts)) == 1 and tgts[0]:
        literal = Literal(tgts[0])

    # Score every unit by the average target length it covers.
    scored: List[Tuple[float, Unit, List[int]]] = []
    for u in _enumerate_units(pairs[0][0], config):
        if budget.charge(len(pairs)):
            return None
        positions: List[int] = []
        total = 0
        ok = True
        for src, tgt in pairs:
            out = u.apply(src)
            if out is None or out == "" or out not in tgt:
                ok = False
                break
            positions.append(tgt.find(out))
            total += len(out)
        if ok:
            scored.append((total / len(pairs), u, positions))
    scored.sort(key=lambda x: (-x[0], repr(x[1])))
    if literal is not None:
        # A literal covering the whole remaining target outranks partial
        # units (it covers the maximum possible length).
        scored.insert(0, (float(len(tgts[0])), literal, [0] * len(pairs)))

    for _, u, positions in scored:
        if budget.exhausted:
            return None
        outs = [u.apply(src) for src, _ in pairs]
        left = [
            (src, tgt[:pos]) for (src, tgt), pos in zip(pairs, positions)
        ]
        right = [
            (src, tgt[pos + len(out) :])
            for (src, tgt), pos, out in zip(pairs, positions, outs)
        ]
        left_sol = _search(left, config, budget, depth + 1)
        if left_sol is None:
            continue
        right_sol = _search(right, config, budget, depth + 1)
        if right_sol is None:
            continue
        return left_sol + [u] + right_sol
    return None


def autojoin_single(
    pairs: Sequence[Tuple[str, str]], config: AutoJoinConfig | None = None
) -> Optional[Transformation]:
    """One Auto-Join search: a single transformation covering *all* pairs."""
    if config is None:
        config = AutoJoinConfig()
    if not pairs:
        return None
    budget = _Budget(config)
    sol = _search(list(pairs), config, budget, 0)
    if sol is None:
        return None
    return Transformation(tuple(sol))
