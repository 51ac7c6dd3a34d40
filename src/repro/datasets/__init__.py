"""Synthetic stand-ins for the paper's six benchmark datasets."""
