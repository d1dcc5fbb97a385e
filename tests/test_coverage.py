"""Coverage computation and the negative-unit cache (paper §4.1.5)."""
from hypothesis import given, settings, strategies as st

from repro.core.coverage import CoverageStats, compute_coverage, coverage_of_set
from repro.core.generate import DiscoveryConfig, generate_for_pairs
from repro.core.units import Literal, Split, Substr, transformation

PAIRS = [
    ("bowling, michael", "m bowling"),
    ("gosgnach, simon", "s gosgnach"),
    ("rafiei, davood", "d rafiei"),
    ("noise row", "unrelated target"),
]


class TestComputeCoverage:
    def test_direct_coverage(self):
        t_all = transformation(Split(",", 0))  # last name
        covers = compute_coverage([t_all], [(s, s.split(",")[0]) for s, _ in PAIRS])
        assert covers[0] == {0, 1, 2, 3}

    def test_mixed_coverage(self):
        t = transformation(Substr(0, 3))
        pairs = [("abcdef", "abc"), ("xyzw", "xyz"), ("ab", "ab")]
        covers = compute_coverage([t], pairs)
        assert covers[0] == {0, 1}

    def test_cache_does_not_change_results(self):
        cands, _ = generate_for_pairs(PAIRS, DiscoveryConfig())
        with_cache = compute_coverage(cands, PAIRS, use_cache=True)
        without = compute_coverage(cands, PAIRS, use_cache=False)
        assert with_cache == without

    def test_cache_hits_recorded(self):
        cands, _ = generate_for_pairs(PAIRS, DiscoveryConfig())
        stats = CoverageStats()
        compute_coverage(cands, PAIRS, stats=stats)
        assert stats.n_checks == len(cands) * len(PAIRS)
        assert 0 < stats.n_cache_hits < stats.n_checks
        assert 0.0 < stats.cache_hit_ratio < 1.0

    def test_no_cache_no_hits(self):
        cands, _ = generate_for_pairs(PAIRS, DiscoveryConfig())
        stats = CoverageStats()
        compute_coverage(cands, PAIRS, use_cache=False, stats=stats)
        assert stats.n_cache_hits == 0

    def test_failing_unit_is_learned(self):
        # Substr(0,99) fails on every row; once learned, the second
        # transformation containing it must be a cache hit.
        bad = Substr(0, 99)
        t1 = transformation(bad, Literal("x"))
        t2 = transformation(bad, Literal("y"))
        stats = CoverageStats()
        covers = compute_coverage([t1, t2], [("abc", "x")], stats=stats)
        assert covers == [set(), set()]
        assert stats.n_cache_hits == 1

    def test_unit_output_not_substring_is_learned(self):
        u = Substr(0, 3)  # "abc" — not inside target "zzz"
        t1 = transformation(u, Literal("p"))
        t2 = transformation(u, Literal("q"))
        stats = CoverageStats()
        compute_coverage([t1, t2], [("abcdef", "zzz")], stats=stats)
        assert stats.n_cache_hits == 1

    def test_substring_output_but_wrong_concat_not_cached(self):
        # Units individually fine but concatenation mismatches — the
        # cache must NOT learn them (they may work in other combos).
        u1, u2 = Substr(0, 1), Substr(1, 2)
        t_wrong = transformation(u2, u1)  # "ba" != "ab"
        t_right = transformation(u1, u2)  # "ab"
        stats = CoverageStats()
        covers = compute_coverage([t_wrong, t_right], [("abX", "ab")], stats=stats)
        assert covers == [set(), {0}]
        assert stats.n_cache_hits == 0

    def test_empty_transformation_list(self):
        assert compute_coverage([], PAIRS) == []

    def test_empty_pairs(self):
        assert compute_coverage([transformation(Literal("x"))], []) == [set()]

    @settings(max_examples=20, deadline=None)
    @given(
        st.lists(
            st.tuples(
                st.text(alphabet="ab,-", min_size=1, max_size=10),
                st.text(alphabet="ab,-", min_size=1, max_size=10),
            ),
            min_size=1,
            max_size=4,
        )
    )
    def test_cache_equivalence_property(self, pairs):
        cands, _ = generate_for_pairs(pairs, DiscoveryConfig())
        assert compute_coverage(cands, pairs, use_cache=True) == compute_coverage(
            cands, pairs, use_cache=False
        )


class TestCoverageOfSet:
    def test_union(self):
        covers = [{0, 1}, {1, 2}, {3}]
        assert coverage_of_set(covers, [0, 1], 4) == 0.75
        assert coverage_of_set(covers, [0, 1, 2], 4) == 1.0

    def test_empty(self):
        assert coverage_of_set([], [], 0) == 0.0
