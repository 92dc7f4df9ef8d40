"""Experiment harnesses reproducing the paper's evaluation (Section VII)."""
