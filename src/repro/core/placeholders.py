"""Placeholder detection (paper §4.1, Definition 4).

A *placeholder* is a contiguous block of target text that also occurs in
the source — evidence of copying. With the unit set of §2 every
non-constant unit copies a contiguous block of its input, so the
placeholder set is exactly the common substrings of source and target.

This module finds placeholders, their match spans in the source, and the
greedy *maximal-length* segmentation of a target into placeholder and
literal segments that seeds skeleton enumeration (§4.1.3).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Tuple

#: Characters treated as "common separators" when tokenizing maximal
#: placeholders (Lemma 4 case 1). The paper reports that spaces and
#: punctuation suffice for all cases observed in its real datasets.
SEPARATOR_CHARS = set(" \t.,;:-_/()[]@&#'\"+|")


@dataclass(frozen=True)
class Segment:
    """One block of a target segmentation.

    ``is_placeholder`` marks a copied block; ``text`` is the block's
    target text and ``tgt_start`` its offset in the target row.
    """

    is_placeholder: bool
    text: str
    tgt_start: int


def match_spans(source: str, txt: str) -> List[Tuple[int, int]]:
    """All occurrences of ``txt`` in ``source`` as [start, end) spans."""
    if not txt:
        return []
    spans = []
    start = source.find(txt)
    while start != -1:
        spans.append((start, start + len(txt)))
        start = source.find(txt, start + 1)
    return spans


def longest_match_at(source: str, target: str, pos: int) -> int:
    """Length of the longest prefix of ``target[pos:]`` occurring in ``source``.

    Linear scan over candidate lengths with early exit; rows in this
    problem are tens of characters so an O(l^2) scan per position is
    within the paper's own cost model (§5.1).
    """
    best = 0
    limit = len(target) - pos
    # Grow while the prefix still occurs; `find` fails fast once it stops.
    while best < limit and source.find(target[pos : pos + best + 1]) != -1:
        best += 1
    return best


def maximal_segmentation(
    source: str, target: str, *, trim_separators: bool = True
) -> List[Segment]:
    """Greedy left-to-right maximal-length segmentation of ``target``.

    At each position take the longest block that is a substring of the
    source as a placeholder; characters not starting any common block
    accumulate into literal segments. The result is the backbone
    skeleton of §4.1.3 (placeholders of maximal length).

    ``trim_separators`` moves separator characters at placeholder
    boundaries into the adjoining literals, matching the paper's worked
    example where ``("Victor Robbie Kasumba", "Victor R. Kasumba")``
    segments as ``<P:'Victor R', L:'. ', P:'Kasumba'>`` — the space
    before ``Kasumba`` occurs in the source but carries no copy signal.
    """
    raw: List[Segment] = []
    literal_start = None
    pos = 0
    while pos < len(target):
        mlen = longest_match_at(source, target, pos)
        if mlen > 0:
            if literal_start is not None:
                raw.append(Segment(False, target[literal_start:pos], literal_start))
                literal_start = None
            raw.append(Segment(True, target[pos : pos + mlen], pos))
            pos += mlen
        else:
            if literal_start is None:
                literal_start = pos
            pos += 1
    if literal_start is not None:
        raw.append(Segment(False, target[literal_start:], literal_start))
    if not trim_separators:
        return raw

    # Trim boundary separators out of placeholders, then merge adjacent
    # literal segments.
    trimmed: List[Segment] = []
    for seg in raw:
        if not seg.is_placeholder:
            trimmed.append(seg)
            continue
        text, start = seg.text, seg.tgt_start
        lead = 0
        while lead < len(text) and text[lead] in SEPARATOR_CHARS:
            lead += 1
        tail = len(text)
        while tail > lead and text[tail - 1] in SEPARATOR_CHARS:
            tail -= 1
        if lead > 0:
            trimmed.append(Segment(False, text[:lead], start))
        if tail > lead:
            trimmed.append(Segment(True, text[lead:tail], start + lead))
        if tail < len(text):
            trimmed.append(Segment(False, text[tail:], start + tail))
    merged: List[Segment] = []
    for seg in trimmed:
        if merged and not seg.is_placeholder and not merged[-1].is_placeholder:
            prev = merged.pop()
            merged.append(Segment(False, prev.text + seg.text, prev.tgt_start))
        else:
            merged.append(seg)
    return merged


def tokenize_placeholder(seg: Segment) -> List[Segment]:
    """Break a placeholder at separator characters (Lemma 4 case 1).

    Runs of separator characters become literal segments; the pieces
    between them become (sub-)placeholders. Returns ``[seg]`` unchanged
    when the placeholder contains no separator or would not actually
    split (all-separator text stays a literal run).
    """
    text = seg.text
    if not any(ch in SEPARATOR_CHARS for ch in text):
        return [seg]
    out: List[Segment] = []
    i = 0
    while i < len(text):
        j = i
        is_sep = text[i] in SEPARATOR_CHARS
        while j < len(text) and (text[j] in SEPARATOR_CHARS) == is_sep:
            j += 1
        out.append(Segment(not is_sep, text[i:j], seg.tgt_start + i))
        i = j
    if sum(1 for s in out if s.is_placeholder) <= 1 and len(out) == 1:
        return [seg]
    return out


def all_placeholders(source: str, target: str, *, maximal_only: bool = True) -> List[str]:
    """Distinct placeholder strings of a pair.

    ``maximal_only`` keeps only the blocks of the greedy maximal
    segmentation; otherwise every common substring is returned (the full
    Definition-4 set — exponential and used only by tests/naive search).
    """
    if maximal_only:
        return [s.text for s in maximal_segmentation(source, target) if s.is_placeholder]
    seen = []
    found = set()
    for i in range(len(target)):
        for j in range(i + 1, len(target) + 1):
            sub = target[i:j]
            if sub not in found and sub in source:
                found.add(sub)
                seen.append(sub)
    return seen
