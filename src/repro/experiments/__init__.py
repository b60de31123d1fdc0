"""Experiment harness and the per-figure table definitions (T15…T25)."""
