"""Experiment harnesses reproducing the paper evaluation tables."""
