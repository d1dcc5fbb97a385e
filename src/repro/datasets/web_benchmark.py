"""Simulated Web-table benchmark (stand-in for the Auto-Join benchmark).

The original benchmark (Zhu et al.) is 31 Google Fusion table pairs
over 17 topics (avg 92 rows/table, avg join entry 31 chars), joinable
under string transformations but noisy. It is not redistributable, so
this module generates 31 table pairs from 17 format-topic generators
with the same load-bearing characteristics (DESIGN.md §3): split/substr
/literal-composable format changes, multiple rules per pair, and a
fraction of noise rows whose targets follow no rule — which is what
makes single-transformation approaches (Auto-Join subsets) fail and
keeps covering sets larger than the rule count.

All generators are deterministic in ``seed``.
"""
from __future__ import annotations

import random
import string
from typing import Callable, Dict, List, Tuple

from .base import TablePair

_SYLLABLES = [
    "an", "bel", "car", "dan", "el", "fra", "gor", "han", "il", "jo",
    "kar", "lin", "mon", "nor", "ol", "pet", "qui", "ros", "san", "tor",
    "ul", "vic", "wil", "xan", "yor", "zan",
]


def _word(rng: random.Random, n_syll: int = 2) -> str:
    return "".join(rng.choice(_SYLLABLES) for _ in range(n_syll))


def _name(rng: random.Random) -> Tuple[str, str]:
    first = _word(rng, rng.randint(2, 3)).capitalize()
    last = _word(rng, rng.randint(2, 3)).capitalize()
    return first, last


def _digits(rng: random.Random, n: int) -> str:
    return "".join(rng.choice(string.digits) for _ in range(n))


# --- topic generators -------------------------------------------------------
# Each returns (source_text, target_text) for one row; rule index selects
# among the pair's transformation rules.

def _t_name_reversal(rng, rule):
    first, last = _name(rng)
    if rule == 0:
        return f"{last}, {first}", f"{first[0]} {last}"
    return f"{last}, {first}", f"{first} {last}"


def _t_name_email(rng, rule):
    # lowercase throughout: case mapping is outside the unit algebra
    # (the paper also lower-cases its worked email example, §3.2)
    first, last = (w.lower() for w in _name(rng))
    src = f"{last}, {first}"
    if rule == 0:
        return src, f"{first}.{last}@example.edu"
    return src, f"{last}@example.edu"


def _t_phone_paren(rng, rule):
    a, b, c = _digits(rng, 3), _digits(rng, 3), _digits(rng, 4)
    if rule == 0:
        return f"({a}) {b}-{c}", f"{a}-{b}-{c}"
    return f"({a}) {b}-{c}", f"1-{a}-{b}-{c}"


def _t_phone_intl(rng, rule):
    d = _digits(rng, 10)
    if rule == 0:
        return d, f"+1 {d[:3]} {d[3:6]} {d[6:]}"
    return d, f"({d[:3]}) {d[3:6]}-{d[6:]}"


def _t_date_iso(rng, rule):
    y = str(rng.randint(1950, 2021))
    m, d = f"{rng.randint(1, 12):02d}", f"{rng.randint(1, 28):02d}"
    if rule == 0:
        return f"{y}-{m}-{d}", f"{m}/{d}/{y}"
    return f"{y}-{m}-{d}", f"{d}.{m}.{y}"


def _t_date_compact(rng, rule):
    y = str(rng.randint(1950, 2021))
    m, d = f"{rng.randint(1, 12):02d}", f"{rng.randint(1, 28):02d}"
    return f"{y}{m}{d}", f"{y}/{m}/{d}"


def _t_state_abbrev(rng, rule):
    name = _word(rng, 3).capitalize()
    abbr = name[:2].upper()
    return f"{name} ({abbr})", abbr if rule == 0 else f"US-{abbr}"


def _t_coords(rng, rule):
    lat = f"{rng.randint(10, 80)}.{_digits(rng, 4)}"
    lon = f"{rng.randint(10, 179)}.{_digits(rng, 4)}"
    return f"{lat}N 113.{lon[-4:]}W", f"{lat}, -113.{lon[-4:]}"


def _t_isbn(rng, rule):
    parts = f"{rng.randint(0,9)}-{_digits(rng,3)}-{_digits(rng,5)}-{rng.randint(0,9)}"
    return parts, f"ISBN {parts}"


def _t_currency(rng, rule):
    amount = f"{rng.randint(1, 9)},{_digits(rng, 3)}.{_digits(rng, 2)}"
    if rule == 0:
        return f"${amount}", f"{amount} USD"
    return f"${amount}", f"USD {amount}"


def _t_url_domain(rng, rule):
    host = f"www.{_word(rng, 2)}.{rng.choice(['com', 'org', 'ca'])}"
    path = _word(rng, 1)
    return f"https://{host}/{path}", host


def _t_email_user(rng, rule):
    first, last = _name(rng)
    src = f"{first.lower()}.{last.lower()}@{_word(rng,1)}mail.com"
    return src, f"{first.lower()} {last.lower()}"


def _t_product_code(rng, rule):
    num, suffix = _digits(rng, 5), rng.choice("ABCDE")
    if rule == 0:
        return f"SKU-{num}-{suffix}", num
    return f"SKU-{num}-{suffix}", f"{num}/{suffix}"


def _t_course_code(rng, rule):
    dept = rng.choice(["CMPUT", "PHYS", "MATH", "CHEM", "BIOL"])
    num = _digits(rng, 3)
    return f"{dept} {num}", f"{dept}-{num}"


def _t_address(rng, rule):
    house = _digits(rng, rng.randint(4, 5))
    street = f"{rng.randint(80, 120)} ST NW"
    if rule == 0:
        return f"{house} {street}", f"{house}-{street}"
    return f"{house} {street}", f"{house} {street}, Edmonton"


def _t_person_title(rng, rule):
    first, last = _name(rng)
    title = rng.choice(["Dr.", "Prof.", "Mr.", "Ms."])
    return f"{title} {first} {last}", f"{last}, {first}"


def _t_game_scores(rng, rule):
    team1, team2 = _word(rng, 2).capitalize(), _word(rng, 2).capitalize()
    s1, s2 = rng.randint(0, 9), rng.randint(0, 9)
    # space-delimited colon so every field is a clean space-split piece;
    # 3 recomposed fields — within the paper's 3-placeholder budget
    return f"{team1} vs {team2} : {s1}-{s2}", f"{team2} {s2}, {team1}"


TOPICS: Dict[str, Tuple[Callable, int]] = {
    # name → (row generator, number of rules)
    "name_reversal": (_t_name_reversal, 2),
    "name_email": (_t_name_email, 2),
    "phone_paren": (_t_phone_paren, 2),
    "phone_intl": (_t_phone_intl, 2),
    "date_iso": (_t_date_iso, 2),
    "date_compact": (_t_date_compact, 1),
    "state_abbrev": (_t_state_abbrev, 2),
    "coords": (_t_coords, 1),
    "isbn": (_t_isbn, 1),
    "currency": (_t_currency, 2),
    "url_domain": (_t_url_domain, 1),
    "email_user": (_t_email_user, 1),
    "product_code": (_t_product_code, 2),
    "course_code": (_t_course_code, 1),
    "address": (_t_address, 2),
    "person_title": (_t_person_title, 1),
    "game_scores": (_t_game_scores, 1),
}


def generate_topic_pair(
    topic: str,
    *,
    n_rows: int = 92,
    noise_frac: float = 0.08,
    seed: int = 0,
) -> TablePair:
    """One benchmark table pair for a topic.

    ``noise_frac`` of rows get an unruly target (random mangling) —
    they may remain joinable by overfit one-off transformations but not
    by any general rule, like the inconsistencies in the real web
    benchmark.
    """
    gen, n_rules = TOPICS[topic]
    rng = random.Random(seed)
    source, target = [], []
    seen = set()
    while len(source) < n_rows:
        rule = rng.randrange(n_rules)
        s, t = gen(rng, rule)
        if s in seen:
            continue
        seen.add(s)
        if rng.random() < noise_frac:
            # mangle: shuffle a few characters / inject junk
            t = t[: len(t) // 2] + rng.choice("!?*#") + t[len(t) // 2 :][::-1]
        source.append(s)
        target.append(t)
    return TablePair(
        name=f"web-{topic}-s{seed}",
        source=source,
        target=target,
        golden=[(i, i) for i in range(n_rows)],
    )


def web_benchmark(
    *, n_tables: int = 31, n_rows: int = 92, noise_frac: float = 0.08, seed: int = 0
) -> List[TablePair]:
    """The 31-table-pair simulated benchmark (17 topics, cycled)."""
    names = list(TOPICS)
    return [
        generate_topic_pair(
            names[k % len(names)],
            n_rows=n_rows,
            noise_frac=noise_frac,
            seed=seed + 31 * k,
        )
        for k in range(n_tables)
    ]
