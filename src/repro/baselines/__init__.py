"""Baseline systems the paper compares against, built from scratch."""
