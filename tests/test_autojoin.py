"""Auto-Join baseline behaviour (paper §3.2)."""
import time

import pytest

from repro.autojoin import AutoJoinConfig, autojoin, autojoin_single
from repro.autojoin.search import _enumerate_units
from repro.core.units import Literal, Split, SplitSubstr, Substr

FIG1_SUBSET = [
    ("prus-czarnecki, andrzej", "a prus-czarnecki"),
    ("bowling, michael", "m bowling"),
    ("gosgnach, simon", "s gosgnach"),
]


class TestEnumerateUnits:
    def test_substr_count(self):
        units = _enumerate_units("abc", AutoJoinConfig(use_split=False, use_splitsubstr=False))
        # l(l+1)/2 spans for l=3
        assert len([u for u in units if isinstance(u, Substr)]) == 6

    def test_split_enumeration(self):
        units = _enumerate_units("a,b", AutoJoinConfig(use_splitsubstr=False))
        assert Split(",", 0) in units and Split(",", 1) in units

    def test_splitsubstr_enumeration(self):
        units = _enumerate_units("ab,c", AutoJoinConfig())
        assert SplitSubstr(",", 0, 0, 2) in units

    def test_every_unit_applies_to_its_source(self):
        src = "ab,cd"
        for u in _enumerate_units(src, AutoJoinConfig()):
            assert u.apply(src) is not None


class TestAutoJoinSingle:
    def test_paper_worked_example(self):
        """§3.2: rows 4–6 of Figure 1's name columns."""
        t = autojoin_single(FIG1_SUBSET)
        assert t is not None
        for src, tgt in FIG1_SUBSET:
            assert t.covers(src, tgt), (str(t), src, tgt)
        # the found transformation generalizes like the paper's
        assert t.apply("doe, jane") == "j doe"

    def test_identity(self):
        t = autojoin_single([("abc", "abc"), ("xyzw", "xyzw")])
        assert t is not None
        assert t.apply("qq") == "qq"

    def test_single_substr(self):
        t = autojoin_single([("abcdef", "bcd"), ("uvwxyz", "vwx")])
        assert t is not None and t.covers("abcdef", "bcd")

    def test_literal_fallback(self):
        t = autojoin_single([("abc", "zz"), ("def", "zz")])
        assert t is not None
        assert t.apply("anything else") == "zz"

    def test_impossible_subset_returns_none(self):
        # No single transformation maps both rows (conflicting formats,
        # no common literal) — the search must fail, not loop forever.
        cfg = AutoJoinConfig(time_limit_sec=5.0, node_budget=50_000)
        t = autojoin_single(
            [("abcd", "dcba"), ("efgh", "xyzq")], cfg
        )
        assert t is None

    def test_empty_input(self):
        assert autojoin_single([]) is None

    def test_respects_time_limit(self):
        cfg = AutoJoinConfig(time_limit_sec=0.5, node_budget=10**9)
        start = time.perf_counter()
        autojoin_single(
            [
                ("abcdefghijklmnopqrstuvwxyz0123", "zyxw0123abcd"),
                ("0123456789abcdefghijklmnopqrst", "qqqqqqqqqqqq"),
            ],
            cfg,
        )
        assert time.perf_counter() - start < 5.0


class TestAutoJoinRunner:
    def test_finds_covering_transformation_on_clean_data(self):
        res = autojoin(FIG1_SUBSET * 2, subset_size=2, n_subsets=4, seed=1)
        assert res.top_coverage == 1.0
        assert not res.timed_out

    def test_multiple_rules_partial_coverage(self):
        # Half the rows follow rule A, half rule B; subsets mixing the
        # two find nothing, homogeneous subsets find one rule each.
        rule_a = [(f"x{i}ab,cd", f"cd-{i}") for i in range(4)]
        pairs = rule_a + [(f"{i}qqq zz", f"zz {i}qqq") for i in range(4)]
        res = autojoin(pairs, subset_size=2, n_subsets=8, seed=3)
        assert 0.0 < res.set_coverage <= 1.0

    def test_total_time_cap(self):
        cfg = AutoJoinConfig(time_limit_sec=10.0, node_budget=10**9)
        start = time.perf_counter()
        res = autojoin(
            [("abcdefghijklmnop", "ponmabcd"), ("qrstuvwxyz012345", "550zzzz")],
            subset_size=2,
            n_subsets=50,
            config=cfg,
            total_time_limit_sec=1.0,
        )
        assert time.perf_counter() - start < 8.0
        assert res.timed_out or res.elapsed_sec <= 8.0

    def test_coverage_over_golden(self):
        res = autojoin(FIG1_SUBSET, subset_size=2, n_subsets=3, seed=0)
        more = FIG1_SUBSET + [("rafiei, davood", "d rafiei")]
        assert res.coverage_over(more) == 1.0

    def test_empty(self):
        res = autojoin([])
        assert res.n_pairs == 0 and res.set_coverage == 0.0
