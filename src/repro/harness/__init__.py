"""Harnesses that print the paper's tables from real runs."""
