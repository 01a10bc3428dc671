"""Harnesses reproducing the paper's evaluation tables (DESIGN.md §4)."""
