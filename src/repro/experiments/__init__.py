"""Experiment harnesses — one module per table of the paper's §5."""
