"""Experiment harnesses: analytic space accounting and the table
generators for the paper's evaluation section."""
