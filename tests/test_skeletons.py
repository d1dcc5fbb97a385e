"""Skeleton enumeration (paper §4.1.3)."""
from hypothesis import given, strategies as st

from repro.core.skeletons import enumerate_skeletons, skeleton_str


def _shapes(skels):
    return {tuple((s.is_placeholder, s.text) for s in sk) for sk in skels}


class TestVictorExample:
    """The paper's worked example must be reproduced verbatim."""

    SRC, TGT = "Victor Robbie Kasumba", "Victor R. Kasumba"

    def test_skeleton_set(self):
        shapes = _shapes(enumerate_skeletons(self.SRC, self.TGT))
        assert (
            (True, "Victor R"),
            (False, ". "),
            (True, "Kasumba"),
        ) in shapes
        assert (
            (True, "Victor"),
            (False, " "),
            (True, "R"),
            (False, ". "),
            (True, "Kasumba"),
        ) in shapes
        assert ((False, "Victor R. Kasumba"),) in shapes

    def test_exactly_three_skeletons(self):
        # keep-whole, tokenized 'Victor R', all-literal — 'Kasumba' has
        # no separators so contributes no extra variant.
        assert len(enumerate_skeletons(self.SRC, self.TGT, max_placeholders=None)) == 3

    def test_max_placeholders_filter(self):
        # The tokenized variant has 3 placeholders; with the knob at 2
        # it must be dropped while the others survive.
        shapes = _shapes(enumerate_skeletons(self.SRC, self.TGT, max_placeholders=2))
        assert len(shapes) == 2
        assert ((False, "Victor R. Kasumba"),) in shapes


class TestBasicProperties:
    def test_concatenation_invariant(self):
        src, tgt = "bowling, michael", "michael.bowling@ualberta.ca"
        for sk in enumerate_skeletons(src, tgt):
            assert "".join(s.text for s in sk) == tgt

    def test_all_literal_always_present(self):
        for src, tgt in [("abc", "xyz"), ("abc", "abc"), ("a b", "b a")]:
            shapes = _shapes(enumerate_skeletons(src, tgt))
            assert ((False, tgt),) in shapes

    def test_no_shared_text_gives_single_literal_skeleton(self):
        skels = enumerate_skeletons("abc", "xyz")
        assert len(skels) == 1

    def test_empty_target(self):
        assert enumerate_skeletons("abc", "") == []

    def test_no_adjacent_literals(self):
        for sk in enumerate_skeletons("Victor Robbie Kasumba", "Victor R. Kasumba"):
            for a, b in zip(sk, sk[1:]):
                assert a.is_placeholder or b.is_placeholder

    def test_no_empty_segments(self):
        for sk in enumerate_skeletons("a-b c", "c a-b"):
            for seg in sk:
                assert seg.text

    def test_cap_on_exploding_rows(self):
        # Many separator-bearing placeholders → 2^p explosion is capped.
        src = "a b c d e f g h i j k l"
        tgt = "a b,c d,e f,g h,i j,k l"
        skels = enumerate_skeletons(src, tgt, max_skeletons=4, max_placeholders=None)
        assert 1 <= len(skels) <= 5  # extremes + all-literal

    @given(
        st.text(alphabet="ab -", min_size=1, max_size=12),
        st.text(alphabet="ab -", min_size=1, max_size=12),
    )
    def test_concatenation_property(self, src, tgt):
        for sk in enumerate_skeletons(src, tgt, max_placeholders=None):
            assert "".join(s.text for s in sk) == tgt


class TestSkeletonStr:
    def test_notation(self):
        (sk,) = [
            s
            for s in enumerate_skeletons("Victor Robbie Kasumba", "Victor R. Kasumba")
            if len(s) == 3
        ]
        assert skeleton_str(sk) == "<(P: 'Victor R'), (L: '. '), (P: 'Kasumba')>"
