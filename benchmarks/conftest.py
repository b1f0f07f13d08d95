"""Benchmark-local configuration.

Benchmarks run the same experiment drivers as ``jobs/`` at reduced
scale (suitable for pytest-benchmark's repeated calibration runs); the
full-scale tables for EXPERIMENTS.md come from the job entrypoints.
"""
