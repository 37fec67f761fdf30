"""Experiment harness reproducing the paper's evaluation (§5)."""
