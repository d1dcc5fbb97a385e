"""Bounded brute-force baseline (paper §3.1) as a correctness oracle."""
from repro.core.generate import DiscoveryConfig
from repro.core.naive import (
    enumerate_all_segmentations,
    naive_best_coverage,
    naive_transformations,
)


class TestEnumerateAllSegmentations:
    def test_every_segmentation_reproduces_target(self):
        for segs in enumerate_all_segmentations("abcab", "abc"):
            assert "".join(s.text for s in segs) == "abc"

    def test_includes_non_maximal(self):
        # "ab" can segment as P"ab", P"a"+P"b", L"ab", P"a"+L"b", ...
        shapes = {
            tuple((s.is_placeholder, s.text) for s in segs)
            for segs in enumerate_all_segmentations("ab", "ab")
        }
        assert ((True, "ab"),) in shapes
        assert ((True, "a"), (True, "b")) in shapes
        assert ((False, "ab"),) in shapes

    def test_max_segments_bound(self):
        segs = enumerate_all_segmentations("aaaa", "aaaa", max_segments=2)
        assert all(len(s) <= 2 for s in segs)

    def test_no_adjacent_literals(self):
        for segs in enumerate_all_segmentations("xy", "xyz"):
            for a, b in zip(segs, segs[1:]):
                assert a.is_placeholder or b.is_placeholder


class TestNaive:
    def test_all_generated_cover_some_pair(self):
        pairs = [("abc,def", "def abc")]
        for t in naive_transformations(pairs, max_segments=4, max_total=5000):
            assert t.covers(*pairs[0])

    def test_best_coverage_simple(self):
        pairs = [("a,b", "b"), ("c,d", "d")]
        t, cov = naive_best_coverage(pairs, max_segments=3)
        assert cov == 2
        assert t.apply("x,y") == "y"

    def test_lemma2_nonmaximal_needed(self):
        # The Lemma 2/3 example: only non-maximal placeholders cover
        # both rows; the naive search must find coverage 2.
        pairs = [("abcdefghijklmn", "defg.jkb"), ("0123456789abcd", "d456.9ab")]
        t, cov = naive_best_coverage(pairs, max_segments=6)
        assert cov == 2

    def test_empty(self):
        t, cov = naive_best_coverage([], max_segments=3)
        assert t is None and cov == 0
