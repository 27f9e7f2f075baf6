"""Experiment harnesses: one module per table of the paper's evaluation
section (Tables 1-6), each producing the same rows the paper reports."""
