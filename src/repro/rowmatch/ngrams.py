"""Character n-gram extraction for row matching (paper §4.2.1).

Joinable row pairs are expected to share n-grams (placeholders are the
backbone of transformations). Rows are indexed by their distinct
character n-grams of sizes n0..nmax; representative n-grams are chosen
by Rscore, the product of the source- and target-column IRFs.
"""
from __future__ import annotations

from typing import Dict, Iterable, List, Set


def ngrams_of(text: str, n0: int = 4, nmax: int = 20) -> Set[str]:
    """Distinct character n-grams of every size in [n0, nmax].

    A row participates in document-frequency counts at most once per
    gram, matching the "number of rows that contain t" definition of
    IRF (Eq. 1).
    """
    out: Set[str] = set()
    L = len(text)
    for n in range(n0, min(nmax, L) + 1):
        for i in range(L - n + 1):
            out.add(text[i : i + n])
    return out


def row_frequencies(rows: Iterable[str], n0: int = 4, nmax: int = 20) -> Dict[str, int]:
    """gram → number of rows containing it (the IRF denominator)."""
    freq: Dict[str, int] = {}
    for text in rows:
        for g in ngrams_of(text, n0, nmax):
            freq[g] = freq.get(g, 0) + 1
    return freq
