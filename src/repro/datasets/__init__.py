"""Benchmark datasets: §6.1 synthetic pairs + simulated real-data stand-ins."""
from .base import TablePair
from .open_data import generate_open_data
from .synth import generate_synth, synth_suite
from .web_benchmark import TOPICS, generate_topic_pair, web_benchmark

__all__ = [
    "TOPICS",
    "TablePair",
    "generate_open_data",
    "generate_synth",
    "generate_topic_pair",
    "synth_suite",
    "web_benchmark",
]
