"""Baseline indexes and search algorithms the paper compares against."""
