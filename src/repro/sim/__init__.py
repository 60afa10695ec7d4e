"""Experiment harness (S12): calibrated time accounting and the runners
that produce each table of EXPERIMENTS.md."""
