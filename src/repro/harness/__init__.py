"""Experiment harnesses: one module per evaluation table (Tables 2-9)."""
