"""Lite reimplementations of the paper's baseline cleaners."""
