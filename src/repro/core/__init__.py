"""The paper's primary contribution: efficient transformation discovery.

Submodules: ``units`` (transformation algebra), ``placeholders`` /
``skeletons`` / ``generate`` (search-space construction), ``coverage``
(negative-cache evaluation), ``setcover`` (solution compilation),
``discover`` (single-machine driver), ``spark_discover`` (distributed
driver), ``naive`` (brute-force cross-check).
"""
from .discover import DiscoveryResult, discover
from .generate import DiscoveryConfig
from .units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    Transformation,
    TwoCharSplitSubstr,
    deserialize,
    transformation,
)

__all__ = [
    "DiscoveryConfig",
    "DiscoveryResult",
    "discover",
    "Literal",
    "Split",
    "SplitSubstr",
    "Substr",
    "Transformation",
    "TwoCharSplitSubstr",
    "deserialize",
    "transformation",
]
