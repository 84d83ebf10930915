"""Synthetic analogues of the paper's seven evaluation datasets."""
