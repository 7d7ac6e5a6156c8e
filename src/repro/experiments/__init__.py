"""Evaluation harnesses reproducing the paper's tables and quoted numbers."""
