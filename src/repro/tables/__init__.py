"""Harnesses reproducing the paper's evaluation tables (Section 6)."""
