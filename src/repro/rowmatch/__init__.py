"""n-gram candidate-pair matching (paper §4.2.1, Algorithm 1)."""
from .matcher import match_rows_local, match_rows_spark, orient_tables
from .metrics import MatchMetrics, score_matching
from .ngrams import ngrams_of, row_frequencies

__all__ = [
    "MatchMetrics",
    "match_rows_local",
    "match_rows_spark",
    "ngrams_of",
    "orient_tables",
    "row_frequencies",
    "score_matching",
]
