"""Reproduction of "Efficiently Transforming Tables for Joinability" (ICDE'22).

Packages: ``core`` (the paper's discovery algorithm), ``rowmatch``
(n-gram candidate-pair matching, Algorithm 1), ``autojoin`` (the
Auto-Join baseline), ``datasets`` (paper-§6.1 synthetic data plus
simulated real-dataset stand-ins), ``synth_data`` (TPC-H-lite
substrate), ``oracle`` (DuckDB result-equality checks).
"""
