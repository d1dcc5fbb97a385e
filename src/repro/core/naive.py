"""Bounded naive brute-force baseline (paper §3.1) — correctness oracle.

Enumerates *every* segmentation of the target into placeholder/literal
blocks (not just maximal-length ones), expands each with the full
candidate-unit sets, and evaluates coverage without caching. Exponential
— usable only on tiny inputs, where it serves as a ground-truth
cross-check that the efficient algorithm does not miss high-coverage
transformations reachable from non-maximal placeholders.
"""
from __future__ import annotations

from itertools import product
from typing import List, Sequence, Set, Tuple

from .generate import DiscoveryConfig, candidate_units
from .placeholders import Segment
from .units import Literal, Transformation


def enumerate_all_segmentations(
    source: str, target: str, *, max_segments: int = 6
) -> List[Tuple[Segment, ...]]:
    """Every placeholder/literal segmentation of ``target`` (bounded)."""
    results: List[Tuple[Segment, ...]] = []

    def rec(pos: int, segs: List[Segment]) -> None:
        if len(segs) > max_segments:
            return
        if pos == len(target):
            results.append(tuple(segs))
            return
        # Placeholder block: any prefix of the rest that occurs in source.
        for end in range(pos + 1, len(target) + 1):
            block = target[pos:end]
            if block in source:
                rec(end, segs + [Segment(True, block, pos)])
            else:
                break  # longer blocks can't be substrings either
        # Literal block: any prefix, but only extend a literal maximally
        # in one step to keep the enumeration finite yet complete —
        # adjacent literals are equivalent to one merged literal.
        if not segs or segs[-1].is_placeholder:
            for end in range(pos + 1, len(target) + 1):
                rec(end, segs + [Segment(False, target[pos:end], pos)])

    rec(0, [])
    return results


def naive_transformations(
    pairs: Sequence[Tuple[str, str]],
    config: DiscoveryConfig | None = None,
    *,
    max_segments: int = 6,
    max_total: int = 200_000,
) -> List[Transformation]:
    """All transformations any pair can generate, via full enumeration."""
    if config is None:
        config = DiscoveryConfig(max_placeholders=None)
    seen: Set[Transformation] = set()
    out: List[Transformation] = []
    for src, tgt in pairs:
        for skel in enumerate_all_segmentations(src, tgt, max_segments=max_segments):
            slots = []
            for seg in skel:
                if seg.is_placeholder:
                    slots.append(candidate_units(src, seg.text, config))
                else:
                    slots.append([Literal(seg.text)])
            for combo in product(*slots):
                t = Transformation(tuple(combo))
                if t not in seen:
                    seen.add(t)
                    out.append(t)
                    if len(out) >= max_total:
                        return out
    return out


def naive_best_coverage(
    pairs: Sequence[Tuple[str, str]], **kwargs
) -> Tuple[Transformation | None, int]:
    """The transformation with maximum coverage, by full enumeration."""
    best, best_cov = None, 0
    for t in naive_transformations(pairs, **kwargs):
        if t.is_pure_literal():
            continue
        cov = sum(1 for s, g in pairs if t.covers(s, g))
        if cov > best_cov:
            best, best_cov = t, cov
    return best, best_cov
