"""Experiment harness reproducing the Section 6 measurement methodology."""
