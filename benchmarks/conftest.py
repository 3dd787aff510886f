"""Benchmark-local fixtures (the session Spark fixture comes from the
repo-root conftest.py)."""
