"""Experiment harnesses that regenerate the paper's evaluation tables."""
