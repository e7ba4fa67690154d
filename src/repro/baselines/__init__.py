"""Baseline truth-discovery algorithms the paper compares against."""
