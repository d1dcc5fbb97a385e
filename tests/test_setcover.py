"""Greedy minimal cover and top-k selection (paper §4.1.6)."""
from repro.core.setcover import greedy_min_cover, top_k_by_coverage
from repro.core.units import Literal, Substr, transformation

T = [transformation(Substr(0, i + 1)) for i in range(5)]
LIT = transformation(Literal("x"))


class TestTopK:
    def test_orders_by_coverage(self):
        covers = [{0}, {0, 1, 2}, {1}, set(), {2, 3}]
        top = top_k_by_coverage(T, covers, k=2)
        assert top[0][1] == {0, 1, 2}
        assert top[1][1] == {2, 3}

    def test_k_larger_than_candidates(self):
        covers = [{0}, {1}]
        assert len(top_k_by_coverage(T[:2], covers, k=10)) == 2

    def test_excludes_pure_literals(self):
        cands = [LIT, T[0]]
        covers = [{0, 1, 2}, {0}]
        top = top_k_by_coverage(cands, covers, k=1, exclude_pure_literals=True)
        assert top[0][0] == T[0]

    def test_tie_breaks_to_fewer_placeholders(self):
        long_t = transformation(Substr(0, 1), Substr(1, 2))
        short_t = transformation(Substr(0, 2))
        top = top_k_by_coverage([long_t, short_t], [{0, 1}, {0, 1}], k=2)
        assert top[0][0] == short_t


class TestGreedyMinCover:
    def test_classic_greedy(self):
        covers = [{0, 1, 2}, {2, 3}, {3}, {4}]
        sol = greedy_min_cover(T[:4], covers, 5)
        picked = [c for _, c in sol]
        assert picked[0] == {0, 1, 2}
        assert set().union(*picked) == {0, 1, 2, 3, 4}
        assert len(sol) == 3

    def test_stops_when_no_gain(self):
        covers = [{0}, {0}, {0}]
        sol = greedy_min_cover(T[:3], covers, 3)
        assert len(sol) == 1  # rows 1, 2 cannot be covered

    def test_min_support_filters(self):
        covers = [{0, 1, 2, 3}, {4}]
        sol = greedy_min_cover(T[:2], covers, 5, min_support=2)
        assert len(sol) == 1 and sol[0][1] == {0, 1, 2, 3}

    def test_exclude_pure_literals(self):
        cands = [LIT, T[0]]
        covers = [{0, 1}, {0, 1}]
        sol = greedy_min_cover(cands, covers, 2, exclude_pure_literals=True)
        assert all(t != LIT for t, _ in sol)

    def test_empty_input(self):
        assert greedy_min_cover([], [], 0) == []

    def test_full_cover_single(self):
        covers = [{0, 1, 2}]
        sol = greedy_min_cover(T[:1], covers, 3)
        assert len(sol) == 1

    def test_deterministic_on_ties(self):
        a = transformation(Substr(0, 1), Substr(2, 3))
        b = transformation(Substr(0, 3))
        sol1 = greedy_min_cover([a, b], [{0}, {0}], 1)
        sol2 = greedy_min_cover([a, b], [{0}, {0}], 1)
        assert sol1 == sol2
