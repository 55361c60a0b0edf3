"""Shared test fixtures/data for the repro test-suite."""
