"""Baseline rewriters HADAD is compared against."""
