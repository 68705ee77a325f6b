"""Experiment harnesses — one module per paper table / figure family."""
