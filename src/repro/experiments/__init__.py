"""Experiment drivers reproducing the paper's evaluation (Figs. 6-12)."""
