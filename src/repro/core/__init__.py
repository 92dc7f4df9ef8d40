"""Core (driver-side) algorithms of the SURGE paper.

Everything here is deterministic, pure-Python/NumPy, and measured per event —
matching how the paper reports every experiment (time per processed object,
search-trigger ratios, approximation ratios). The Spark layer in
``repro.spark`` holds the data-parallel formulations.
"""
