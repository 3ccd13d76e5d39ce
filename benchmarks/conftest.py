"""Benchmarks reuse the session SparkSession fixture from the repo root."""
