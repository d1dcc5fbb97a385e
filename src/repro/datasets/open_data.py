"""Simulated Open-data benchmark (Edmonton addresses × white pages).

The paper joins ~3M Edmonton property assessments with white-pages
listings on the address field; the golden set has 3,808 matched rows,
and n-gram matching yields ~360k candidate pairs at precision 0.01 —
the dataset's load-bearing property is that grid addresses share many
n-grams (house numbers and numbered streets repeat), flooding the
matcher with false positives, while only a few true transformation
rules exist. Discovery then runs on a small sample with a support
threshold (§6.4).

This generator reproduces those properties at configurable scale:
house/street numbers are drawn from small pools so address prefixes
collide across rows, targets follow 3 formatting rules, and golden
pairs are (i, i).
"""
from __future__ import annotations

import random
from typing import List

from .base import TablePair

_STREET_TYPES = ["ST", "AVE"]
_QUADRANT = ["NW", "SW"]


def generate_open_data(
    n_rows: int = 3808,
    *,
    seed: int = 0,
    house_pool: int | None = None,
    street_pool: int | None = None,
) -> TablePair:
    """Assessment-format vs white-pages-format address columns.

    Small ``house_pool``/``street_pool`` relative to ``n_rows`` forces
    shared n-grams across distinct addresses — the false-positive
    source that crushes matching precision, as in the paper. Pools
    default to ~n/12 houses and ~n/100 streets so the collision rate is
    scale-invariant.
    """
    rng = random.Random(seed)
    if house_pool is None:
        house_pool = max(40, n_rows // 12)
    if street_pool is None:
        street_pool = max(10, min(40, n_rows // 100))
    houses = [str(rng.randint(10000, 12999)) for _ in range(house_pool)]
    streets = [str(rng.randint(95, 95 + street_pool - 1)) for _ in range(street_pool)]

    source, target = [], []
    seen = set()
    while len(source) < n_rows:
        house = rng.choice(houses)
        street = rng.choice(streets)
        stype = rng.choice(_STREET_TYPES)
        quad = rng.choice(_QUADRANT)
        src = f"{house} {street} {stype} {quad}"
        if src in seen:
            continue
        seen.add(src)
        # The three white-pages rules keep the "<house> <street>" block
        # contiguous (suffix / truncation / literal prefix), so true
        # pairs share long n-grams (high recall) while reused house and
        # street numbers flood short-gram matches (low precision).
        rule = rng.randrange(3)
        if rule == 0:
            tgt = f"{house} {street} {stype} {quad}, EDMONTON"
        elif rule == 1:
            tgt = f"{house} {street} {stype}"
        else:
            tgt = f"APT-{house} {street} {stype} {quad}"
        source.append(src)
        target.append(tgt)
    return TablePair(
        name=f"open-data-{n_rows}-s{seed}",
        source=source,
        target=target,
        golden=[(i, i) for i in range(n_rows)],
    )
