"""End-to-end single-machine discovery (paper §4.1, Figure 1 examples)."""
from repro.core import DiscoveryConfig, discover
from repro.core.naive import naive_best_coverage

# Figure 1 right-hand tables: "Name" ↔ "Name" (lower-cased as in §3.2)
FIG1_NAMES = [
    ("rafiei, davood", "d rafiei"),
    ("nascimento, mario a", "m a nascimento"),
    ("gingrich, douglas m", "d gingrich"),
    ("prus-czarnecki, andrzej", "a prus-czarnecki"),
    ("bowling, michael", "m bowling"),
    ("gosgnach, simon", "s gosgnach"),
]

# Figure 1 left-hand tables: name → email (multiple rules, noise-like)
FIG1_EMAILS = [
    ("rafiei, davood", "drafiei@ualberta.ca"),
    ("bowling, michael", "michael.bowling@ualberta.ca"),
    ("nascimento, mario a", "mario.nascimento@ualberta.ca"),
    ("gosgnach, simon", "gosgnach@ualberta.ca"),
]


class TestFig1Names:
    def test_top_transformation_covers_initial_lastname_rows(self):
        # 5 of 6 rows follow "F Lastname"; "Nascimento, Mario A" needs
        # the middle initial too, so no single transformation covers it.
        res = discover(FIG1_NAMES)
        assert res.top_coverage == 5 / 6

    def test_cover_set_reaches_full_coverage(self):
        res = discover(FIG1_NAMES)
        assert len(res.cover_set) == 2
        assert res.set_coverage == 1.0

    def test_discovered_transformation_generalizes(self):
        res = discover(FIG1_NAMES)
        t = res.top[0][0]
        # apply to an unseen row
        assert t.apply("doe, jane") == "j doe"


class TestFig1Emails:
    def test_covering_set_handles_multiple_rules(self):
        res = discover(FIG1_EMAILS)
        assert res.set_coverage == 1.0
        # no single string rule maps all four name→email formats
        assert len(res.cover_set) >= 2

    def test_first_rule_covers_the_dotted_emails(self):
        res = discover(FIG1_EMAILS)
        best, cov = res.cover_set[0]
        assert len(cov) >= 2
        assert best.apply("doe, jane") in ("jane.doe@ualberta.ca", "jdoe@ualberta.ca", "doe@ualberta.ca")


class TestAgainstNaive:
    def test_matches_naive_best_coverage(self):
        # The efficient algorithm must find a transformation at least as
        # good as exhaustive enumeration's best (on a tiny input).
        pairs = FIG1_NAMES[:3]
        _, naive_cov = naive_best_coverage(pairs, max_segments=5)
        res = discover(pairs)
        assert len(res.top[0][1]) >= naive_cov

    def test_lemma3_nonmaximal_coverage_recovered(self):
        # Lemma 3's example: maximal placeholders give coverage 1 each;
        # the tokenized/literal route must still cover each row.
        pairs = [("12345sabcdefg", "abcdefg"), ("67890taxxxx", "axxxx")]
        res = discover(pairs)
        assert res.set_coverage == 1.0


class TestKnobs:
    def test_sampling(self):
        res = discover(FIG1_NAMES * 10, sample_size=6, seed=1)
        assert res.n_pairs == 6
        assert res.top_coverage == 1.0

    def test_min_support_frac(self):
        # The noise row's one-off transformations are filtered by support.
        pairs = FIG1_NAMES + [("noise", "zzz")]
        res = discover(pairs, min_support_frac=0.3)
        assert all(len(c) >= 2 for _, c in res.cover_set)

    def test_stats_populated(self):
        res = discover(FIG1_NAMES)
        assert res.gen_stats.n_generated > res.gen_stats.n_unique > 0
        assert res.cov_stats.n_checks > 0
        assert res.elapsed_sec > 0

    def test_no_cache_same_answer(self):
        a = discover(FIG1_NAMES, use_cache=False)
        b = discover(FIG1_NAMES, use_cache=True)
        assert a.top_coverage == b.top_coverage
        assert a.set_coverage == b.set_coverage

    def test_coverage_over_external_pairs(self):
        res = discover(FIG1_NAMES[:4])
        assert res.coverage_over(FIG1_NAMES) == 1.0
        assert res.top_coverage_over(FIG1_NAMES) == 5 / 6

    def test_empty_input(self):
        res = discover([])
        assert res.n_pairs == 0
        assert res.top_coverage == 0.0 and res.set_coverage == 0.0
