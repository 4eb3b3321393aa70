"""Experiment harnesses reproducing each table/figure of the paper."""
