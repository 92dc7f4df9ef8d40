"""Reproduction of "SURGE: Continuous Detection of Bursty Regions over a
Stream of Spatial Objects" (Feng et al., ICDE 2018).

Subpackages: ``core`` (the paper's algorithms, per-event), ``spark`` (the
Catalyst dataflow formulations), ``experiments`` (datasets/harness/tables).
``synth_data`` (TPC-H-lite) and ``oracle`` (DuckDB equality checker) are the
repo-provided substrate.
"""
