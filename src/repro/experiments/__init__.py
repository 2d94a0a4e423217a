"""Evaluation harnesses reproducing the paper's §5 experiments (T1-T4)."""
