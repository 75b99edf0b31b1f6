"""Evaluation harnesses: the 12 named data sets and the generators for
the paper's Tables 2-5 (see EXPERIMENTS.md)."""
