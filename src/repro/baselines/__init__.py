"""Baseline systems the paper compares against (DESIGN.md §1–2)."""
