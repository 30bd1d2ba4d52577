"""Experiment harness regenerating the paper's evaluation tables."""
