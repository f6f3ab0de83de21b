"""Experiment harnesses reproducing the paper's evaluation (Sec 7)."""
