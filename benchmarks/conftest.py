"""Benchmark fixtures: reuse the session SparkSession from the root conftest."""
