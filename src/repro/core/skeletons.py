"""Transformation-skeleton enumeration (paper §4.1.3).

A *skeleton* is a segmentation of a target row into placeholders and
literals whose concatenation reproduces the target. Skeletons are built
from the greedy maximal-length segmentation; each maximal placeholder
may independently be kept whole or tokenized at common separators
(Lemma 4 case 1), giving ≤ 2^p skeletons, plus the all-literal skeleton
(the whole target as one literal). This reproduces the paper's
``Victor Robbie Kasumba`` example exactly.
"""
from __future__ import annotations

from itertools import product
from typing import List, Optional

from .placeholders import Segment, maximal_segmentation, tokenize_placeholder

Skeleton = tuple  # Tuple[Segment, ...]


def enumerate_skeletons(
    source: str,
    target: str,
    *,
    max_placeholders: Optional[int] = None,
    max_skeletons: int = 64,
) -> List[Skeleton]:
    """All skeletons of a (source, target) pair.

    A skeleton may carry any number of placeholders; the paper's
    transformation-length knob (≤ 3 placeholders, §6.2) is enforced at
    transformation-generation time, where excess placeholders are
    assigned their ``Literal`` candidate ("each placeholder may also be
    replaced with a literal", §4.1.4). ``max_placeholders`` here is an
    optional *skeleton-level* filter used by tests; ``max_skeletons``
    caps the 2^p tokenization expansion for pathological rows.
    """
    if not target:
        return []
    base = maximal_segmentation(source, target)

    skeletons: List[Skeleton] = []
    seen = set()

    def _emit(segs: List[Segment]) -> None:
        merged = _merge_adjacent_literals(segs)
        key = tuple((s.is_placeholder, s.text) for s in merged)
        if key in seen:
            return
        n_ph = sum(1 for s in merged if s.is_placeholder)
        if max_placeholders is not None and n_ph > max_placeholders:
            return
        seen.add(key)
        skeletons.append(tuple(merged))

    # Cartesian choice per maximal placeholder: keep whole vs tokenized.
    options = []
    for seg in base:
        if seg.is_placeholder:
            tokenized = tokenize_placeholder(seg)
            opts = [[seg]]
            if len(tokenized) > 1:
                opts.append(tokenized)
            options.append(opts)
        else:
            options.append([[seg]])
    n_combos = 1
    for opts in options:
        n_combos *= len(opts)
    if n_combos > max_skeletons:
        # Keep the two extreme skeletons (all-kept and all-tokenized)
        # when the 2^p expansion would explode.
        _emit([s for opts in options for s in opts[0]])
        _emit([s for opts in options for s in opts[-1]])
    else:
        for choice in product(*options):
            _emit([s for segs in choice for s in segs])

    # The all-literal skeleton: target occurring verbatim, or constants
    # that happen to appear in the source (§4.1.4).
    if target:
        _emit([Segment(False, target, 0)])
    return skeletons


def _merge_adjacent_literals(segs: List[Segment]) -> List[Segment]:
    """Normalize a segmentation: adjacent literals collapse into one."""
    out: List[Segment] = []
    for seg in segs:
        if out and not seg.is_placeholder and not out[-1].is_placeholder:
            prev = out.pop()
            out.append(Segment(False, prev.text + seg.text, prev.tgt_start))
        else:
            out.append(seg)
    return [s for s in out if s.text]


def skeleton_str(skel: Skeleton) -> str:
    """Human-readable form matching the paper's notation."""
    parts = [
        f"({'P' if s.is_placeholder else 'L'}: {s.text!r})" for s in skel
    ]
    return "<" + ", ".join(parts) + ">"
