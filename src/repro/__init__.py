"""Reproduction of BClean (ICDE 2024) in PySpark."""
