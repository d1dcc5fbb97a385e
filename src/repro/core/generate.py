"""Candidate-unit inference and transformation generation (paper §4.1.4).

Given a skeleton, each placeholder is replaced by the set of units that
provably map the source onto the placeholder text — inferred from the
placeholder's match spans instead of a blind parameter sweep, which is
the paper's key efficiency lever. The Cartesian product of the per-
placeholder candidate sets (with literal segments fixed) yields the
candidate transformations of the row; duplicates across skeletons and
rows are removed with a hash set (§4.1.5).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations, product
from typing import Dict, Iterable, List, Sequence, Set, Tuple

from .placeholders import SEPARATOR_CHARS, match_spans
from .skeletons import Skeleton, enumerate_skeletons
from .units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    Transformation,
    TwoCharSplitSubstr,
    Unit,
)


#: Preference order for delimiters known to be absent from a source row.
#: ``Split(c, 0)`` with an absent ``c`` returns the whole input (Lemma 1
#: case 1) — the only way the unit set expresses an identity copy of a
#: variable-length string. Rows that don't contain the first character
#: here all infer the *same* unit, so the transformation generalizes.
ABSENT_DELIMITERS = "\t|~\x00"


@dataclass(frozen=True)
class DiscoveryConfig:
    """Knobs of the discovery algorithm, mirroring the paper's §6.2 setup.

    ``max_placeholders`` is the paper's transformation-length/tree-depth
    parameter (set to 3 in its experiments). ``use_twochar`` enables the
    TwoCharSplitSubstr unit, which §6.2 excludes. The two ``max_*`` caps
    are safety valves for pathological rows; the paper relies on its
    2^p / (ul)^p bounds for the same purpose (§5.1).
    """

    max_placeholders: int = 3
    use_split: bool = True
    use_splitsubstr: bool = True
    use_twochar: bool = False
    max_candidates_per_placeholder: int = 64
    max_transforms_per_skeleton: int = 50_000
    max_skeletons: int = 64


def candidate_units(source: str, txt: str, config: DiscoveryConfig) -> List[Unit]:
    """Units that map ``source`` onto the placeholder text ``txt``.

    Follows §4.1.4 cases (1)–(5): Substr at each match span; Split with
    a delimiter adjacent to a span; SplitSubstr with any source char not
    occurring in ``txt``; optional TwoCharSplitSubstr; and Literal(txt)
    for constants that match the source by chance.
    """
    units: List[Unit] = []
    seen: Set[Unit] = set()

    def _add(u: Unit) -> None:
        if u not in seen and u.apply(source) == txt:
            seen.add(u)
            units.append(u)

    chars_not_in_txt = [c for c in dict.fromkeys(source) if c not in txt]
    for s, e in match_spans(source, txt):
        _add(Substr(s, e))
        if config.use_split:
            # Case (2): delimiter adjacent to the match span.
            for c in {source[s - 1] if s > 0 else None, source[e] if e < len(source) else None}:
                if c is not None and c not in txt:
                    _add(Split(c, source.count(c, 0, s)))
            if s == 0 and e == len(source):
                # Full-span copy: no adjacent delimiter exists, so use a
                # delimiter absent from the source (identity split).
                for c in ABSENT_DELIMITERS:
                    if c not in source:
                        _add(Split(c, 0))
                        break
        if config.use_splitsubstr:
            # Case (3): a source char absent from txt; the span then
            # lies within a single piece of the split. Delimiters are
            # restricted to separator characters and span-adjacent
            # characters: formatting splits on punctuation in practice,
            # and a SplitSubstr on a mid-text alphanumeric delimiter is
            # coverage-dominated by the corresponding Substr (its piece
            # prefix equals the raw source prefix wherever it applies),
            # so nothing reachable is lost while the candidate blowup
            # from incidental matches is avoided.
            adjacent = {
                source[s - 1] if s > 0 else None,
                source[e] if e < len(source) else None,
            }
            for c in chars_not_in_txt:
                if c not in SEPARATOR_CHARS and c not in adjacent:
                    continue
                i = source.count(c, 0, s)
                piece_start = source.rfind(c, 0, s) + 1
                _add(SplitSubstr(c, i, s - piece_start, e - piece_start))
        if config.use_twochar:
            # Case (4): pairs of delimiters, both absent from txt.
            for c1 in chars_not_in_txt:
                for c2 in chars_not_in_txt:
                    if c1 >= c2:
                        continue
                    merged = source.replace(c2, c1)
                    i = merged.count(c1, 0, s)
                    piece_start = merged.rfind(c1, 0, s) + 1
                    _add(TwoCharSplitSubstr(c1, c2, i, s - piece_start, e - piece_start))
        if len(units) >= config.max_candidates_per_placeholder:
            break
    # Case (5): a literal that happens to occur in the source.
    lit = Literal(txt)
    if lit not in seen:
        units.append(lit)
    return units[: config.max_candidates_per_placeholder + 1]


def transformations_for_skeleton(
    source: str, skel: Skeleton, config: DiscoveryConfig
) -> Iterable[Transformation]:
    """Constrained Cartesian product of per-placeholder candidates (§4.1.4).

    Every placeholder slot can take either a non-constant candidate unit
    or its ``Literal`` fallback; the paper's length knob limits the
    number of *non-literal* units per transformation to
    ``config.max_placeholders``. Enumeration therefore walks the subsets
    of placeholder slots of size ≤ max_placeholders (the slots receiving
    non-literal units) and takes the product of their candidate sets —
    equivalent to the full Cartesian product filtered by transformation
    length, without materializing the oversized combinations.
    """
    nonlit: List[List[Unit]] = []
    lits: List[Unit] = []
    ph_slots: List[int] = []
    for idx, seg in enumerate(skel):
        lits.append(Literal(seg.text))
        if seg.is_placeholder:
            cands = [
                u
                for u in candidate_units(source, seg.text, config)
                if not isinstance(u, Literal)
            ]
            nonlit.append(cands)
            ph_slots.append(idx)
        else:
            nonlit.append([])
    max_p = min(
        len(ph_slots),
        len(ph_slots) if config.max_placeholders is None else config.max_placeholders,
    )
    # Ascending k: combinations with fewer non-literal units first, so
    # the per-skeleton cap trims the most-overfit tail (many-placeholder
    # combos over incidental single-character matches), never the simple
    # general transformations.
    emitted = 0
    for k in range(0, max_p + 1):
        for chosen in combinations(ph_slots, k):
            if any(not nonlit[i] for i in chosen):
                continue
            for combo in product(*(nonlit[i] for i in chosen)):
                units = list(lits)
                for slot, unit in zip(chosen, combo):
                    units[slot] = unit
                yield Transformation(tuple(units))
                emitted += 1
                if emitted >= config.max_transforms_per_skeleton:
                    return


@dataclass
class GenerationStats:
    """Counters behind Table 3's "Generated trans." / "Trans. to try"."""

    n_generated: int = 0
    n_unique: int = 0

    @property
    def duplicate_fraction(self) -> float:
        if self.n_generated == 0:
            return 0.0
        return 1.0 - self.n_unique / self.n_generated

    def merge(self, other: "GenerationStats") -> None:
        self.n_generated += other.n_generated
        self.n_unique += other.n_unique


def generate_for_pair(
    source: str, target: str, config: DiscoveryConfig
) -> Tuple[List[Transformation], int]:
    """All candidate transformations of one (source, target) pair.

    Returns the transformations (deduplicated within the pair) and the
    raw generated count *before* dedup, which feeds the Table 3 pruning
    statistics.
    """
    out: List[Transformation] = []
    seen: Set[Transformation] = set()
    n_generated = 0
    for skel in enumerate_skeletons(
        source, target, max_skeletons=config.max_skeletons
    ):
        for t in transformations_for_skeleton(source, skel, config):
            n_generated += 1
            if t not in seen:
                seen.add(t)
                out.append(t)
    return out, n_generated


def generate_for_pairs(
    pairs: Sequence[Tuple[str, str]], config: DiscoveryConfig
) -> Tuple[List[Transformation], GenerationStats]:
    """Generate and hash-dedup transformations across all input pairs."""
    stats = GenerationStats()
    seen: Set[Transformation] = set()
    unique: List[Transformation] = []
    for src, tgt in pairs:
        cands, n_gen = generate_for_pair(src, tgt, config)
        stats.n_generated += n_gen
        for t in cands:
            if t not in seen:
                seen.add(t)
                unique.append(t)
    stats.n_unique = len(unique)
    return unique, stats
