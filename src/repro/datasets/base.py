"""Common dataset container for all table-pair benchmarks."""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import List, Optional, Tuple

from pyspark.sql import DataFrame, SparkSession

from repro.core.units import Transformation


@dataclass
class TablePair:
    """A joinable table pair with golden matches.

    ``source``/``target`` are the join columns (one string per row);
    ``golden`` holds (source index, target index) pairs of truly
    joinable rows; ``golden_transformations`` — when the generator knows
    them — are the rules used to derive targets, for sanity checks.
    """

    name: str
    source: List[str]
    target: List[str]
    golden: List[Tuple[int, int]]
    golden_transformations: Optional[List[Transformation]] = None

    def golden_text_pairs(self) -> List[Tuple[str, str]]:
        """Golden matches as (source text, target text) pairs."""
        return [(self.source[i], self.target[j]) for i, j in self.golden]

    def avg_source_len(self) -> float:
        return sum(map(len, self.source)) / max(len(self.source), 1)

    def to_spark(self, spark: SparkSession) -> Tuple[DataFrame, DataFrame]:
        """(source_df, target_df) with columns (row_id, text)."""
        src = spark.createDataFrame(
            list(enumerate(self.source)), ["row_id", "text"]
        )
        tgt = spark.createDataFrame(
            list(enumerate(self.target)), ["row_id", "text"]
        )
        return src, tgt
