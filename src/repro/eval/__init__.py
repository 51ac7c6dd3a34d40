"""Metrics and the experiment harness behind Tables 4-7."""
