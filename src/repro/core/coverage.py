"""Coverage computation with the negative-unit cache (paper §4.1.5).

A transformation covers a row pair iff the concatenation of its unit
outputs equals the target. Before applying a transformation to a row we
consult the row's *negative-unit cache* — units already known to produce
output that is not a substring of the row's target (or no output at
all). Any transformation containing such a unit cannot cover the row
and is skipped in O(1). Because candidate transformations are Cartesian
products of shared unit sets, the same units recur across many
transformations and the cache short-circuits most checks (Table 3
reports hit ratios of 74–99%).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Sequence, Set, Tuple

from .units import Literal, Transformation, Unit


@dataclass
class CoverageStats:
    """Counters behind Table 3's "Cache hit ratio"."""

    n_checks: int = 0  # (transformation, row) coverage checks attempted
    n_cache_hits: int = 0  # checks short-circuited by the negative cache

    @property
    def cache_hit_ratio(self) -> float:
        if self.n_checks == 0:
            return 0.0
        return self.n_cache_hits / self.n_checks

    def merge(self, other: "CoverageStats") -> None:
        self.n_checks += other.n_checks
        self.n_cache_hits += other.n_cache_hits


def compute_coverage(
    transformations: Sequence[Transformation],
    pairs: Sequence[Tuple[str, str]],
    *,
    use_cache: bool = True,
    stats: CoverageStats | None = None,
) -> List[Set[int]]:
    """Row-index cover set of every transformation.

    Returns ``cover[i]`` = indices of ``pairs`` covered by
    ``transformations[i]``. ``use_cache=False`` disables the negative-
    unit cache (for the pruning-effectiveness experiment); results are
    identical either way — the cache only saves work.
    """
    if stats is None:
        stats = CoverageStats()
    covers: List[Set[int]] = [set() for _ in transformations]

    # Intern units as integer ids: transformations are Cartesian
    # products of shared unit sets, so the distinct-unit table is tiny
    # relative to the transformation count, and integer-set operations
    # avoid re-hashing dataclass units on the O(n_trans × n_rows) hot
    # path (§4.1.5's caching made cheap).
    unit_ids: Dict[Unit, int] = {}
    unit_objs: List[Unit] = []
    trans_units: List[Tuple[int, ...]] = []
    trans_unit_sets: List[frozenset] = []
    for t in transformations:
        ids = []
        for u in t.units:
            uid = unit_ids.get(u)
            if uid is None:
                uid = len(unit_objs)
                unit_ids[u] = uid
                unit_objs.append(u)
            ids.append(uid)
        trans_units.append(tuple(ids))
        trans_unit_sets.append(frozenset(ids))

    # Per-row negative cache: unit ids that cannot appear in any
    # covering transformation of that row; plus a positive memo of unit
    # outputs on the row.
    neg: List[Set[int]] = [set() for _ in pairs]
    memo: List[Dict[int, str]] = [dict() for _ in pairs]
    n_checks = 0
    n_hits = 0
    for ti in range(len(transformations)):
        uids = trans_units[ti]
        uid_set = trans_unit_sets[ti]
        cover = covers[ti]
        for ri, (src, tgt) in enumerate(pairs):
            n_checks += 1
            row_neg = neg[ri]
            if use_cache and not row_neg.isdisjoint(uid_set):
                n_hits += 1
                continue
            row_memo = memo[ri] if use_cache else None
            if _apply_and_learn(uids, unit_objs, src, tgt, row_neg, row_memo):
                cover.add(ri)
    stats.n_checks += n_checks
    stats.n_cache_hits += n_hits
    return covers


def _apply_and_learn(
    uids: Tuple[int, ...],
    unit_objs: List[Unit],
    src: str,
    tgt: str,
    neg: Set[int],
    memo: Dict[int, str] | None,
) -> bool:
    """Apply the unit sequence to ``src``; learn negative units on the way.

    A unit is negative for the row when its output is None or not a
    substring of the target — then no transformation containing it can
    produce the target by concatenation.
    """
    out: List[str] = []
    for uid in uids:
        if memo is not None and uid in memo:
            piece = memo[uid]
        else:
            piece = unit_objs[uid].apply(src)
            if piece is None or (piece and piece not in tgt):
                neg.add(uid)
                return False
            if memo is not None:
                memo[uid] = piece
        out.append(piece)
    return "".join(out) == tgt


def coverage_of_set(
    covers: Sequence[Set[int]], selected: Sequence[int], n_rows: int
) -> float:
    """Fraction of rows covered by the union of ``selected`` cover sets."""
    if n_rows == 0:
        return 0.0
    covered: Set[int] = set()
    for i in selected:
        covered |= covers[i]
    return len(covered) / n_rows
