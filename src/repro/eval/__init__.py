"""Evaluation harness: Spark fan-out of systems over benchmarks, metrics,
and the reproduction of the paper's Tables 3 and 5-10."""
