"""Benchmark registry: pipelines (Tables 2-3, 7), datasets (Tables 4-6),
views + expected rewrites (Tables 12-15), timing harness."""
