"""Analytical Spark-execution simulator: the cluster substrate.

Models stage-based execution of a subQ DAG under all 19 knobs — wave
scheduling, per-task overhead, spill, shuffle compression/fetch, broadcast,
skew — plus the AQE runtime loop with parametric-rule re-optimization.
"""
