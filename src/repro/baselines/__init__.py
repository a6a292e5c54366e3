"""Baselines the paper compares against, re-implemented from scratch."""
