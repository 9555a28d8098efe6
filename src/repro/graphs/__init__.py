"""Synthetic graph generators substituting the paper's 18-graph suite."""
