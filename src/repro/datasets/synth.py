"""Synthetic table pairs per the paper's §6.1 generator.

Synth-N: N rows, source length U[20, 35]. Synth-NL: N rows, source
length U[40, 70]. Each table pair is covered by exactly 3 randomly
generated transformations; each transformation has p=2 placeholders and
1–2 literal blocks of length U[1, 5], with units drawn from
{Substr, Split, SplitSubstr} with random valid parameters. A uniformly
chosen transformation maps each source row to its target row, so golden
pairs are (i, i).

Transformations are rejection-sampled to be applicable to every source
row of the table (the paper requires each generated transformation to
apply to any row it is assigned to); placeholder-producing units are
biased toward outputs of ≥ 4 characters so the n-gram row matching of
§4.2.1 has signal, mirroring the real datasets.
"""
from __future__ import annotations

import random
import string
from typing import List, Optional, Tuple

from repro.core.units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    Transformation,
    Unit,
)

from .base import TablePair

_ALNUM = string.ascii_lowercase + string.digits


def _random_source(rng: random.Random, len_range: Tuple[int, int]) -> str:
    n = rng.randint(*len_range)
    return "".join(rng.choice(_ALNUM) for _ in range(n))


def _random_literal(rng: random.Random) -> Literal:
    n = rng.randint(1, 5)
    # Literals draw from a separator-ish alphabet plus letters, like the
    # formatting glue seen in real data.
    alphabet = _ALNUM + "-_./ "
    return Literal("".join(rng.choice(alphabet) for _ in range(n)))


def _random_placeholder_unit(
    rng: random.Random, min_len: int
) -> Unit:
    """A random non-constant unit valid for any source of ≥ min_len chars."""
    kind = rng.choice(["substr", "substr", "split", "splitsubstr"])
    if kind == "substr":
        width = rng.randint(4, 10)
        s = rng.randint(0, max(0, min_len - width))
        return Substr(s, s + width)
    if kind == "split":
        # piece 0 always exists; the delimiter may or may not occur
        return Split(rng.choice(_ALNUM), 0)
    width = rng.randint(4, 8)
    s = rng.randint(0, 4)
    return SplitSubstr(rng.choice(_ALNUM), 0, s, s + width)


def _random_transformation(rng: random.Random, min_len: int) -> Transformation:
    """p=2 placeholders and 1–2 literals in a random arrangement (§6.1)."""
    ph = [_random_placeholder_unit(rng, min_len) for _ in range(2)]
    lit = [_random_literal(rng) for _ in range(rng.randint(1, 2))]
    # Random placement without two adjacent literals (they would merge).
    if len(lit) == 1:
        arrangements = [
            [ph[0], lit[0], ph[1]],
            [lit[0], ph[0], ph[1]],
            [ph[0], ph[1], lit[0]],
        ]
    else:
        arrangements = [
            [lit[0], ph[0], lit[1], ph[1]],
            [ph[0], lit[0], ph[1], lit[1]],
            [lit[0], ph[0], ph[1], lit[1]],
        ]
    return Transformation(tuple(arrangements[rng.randrange(3)]))


def generate_synth(
    n_rows: int,
    *,
    long_rows: bool = False,
    n_transformations: int = 3,
    seed: int = 0,
    name: Optional[str] = None,
) -> TablePair:
    """One Synth-N (or Synth-NL) table pair."""
    rng = random.Random(seed)
    len_range = (40, 70) if long_rows else (20, 35)
    sources = [_random_source(rng, len_range) for _ in range(n_rows)]
    min_len = min(map(len, sources))

    transformations: List[Transformation] = []
    attempts = 0
    while len(transformations) < n_transformations and attempts < 500:
        attempts += 1
        t = _random_transformation(rng, min_len)
        outs = [t.apply(s) for s in sources]
        # valid for every row, and target text long enough to match on
        if all(o is not None and len(o) >= 4 for o in outs):
            if t not in transformations:
                transformations.append(t)
    if len(transformations) < n_transformations:  # pragma: no cover
        raise RuntimeError("synthetic transformation sampling failed")

    targets = []
    for s in sources:
        t = rng.choice(transformations)
        targets.append(t.apply(s))
    return TablePair(
        name=name or f"Synth-{n_rows}{'L' if long_rows else ''}-s{seed}",
        source=sources,
        target=targets,
        golden=[(i, i) for i in range(n_rows)],
        golden_transformations=transformations,
    )


def synth_suite(
    n_rows: int, *, long_rows: bool = False, n_tables: int = 10, seed: int = 0
) -> List[TablePair]:
    """The paper's "mean over 10 independently generated tables"."""
    return [
        generate_synth(n_rows, long_rows=long_rows, seed=seed + 101 * k)
        for k in range(n_tables)
    ]
