"""Real-Spark validation layer: the per-query-settable θp knobs applied to
the live local session, with physical-plan inspection and DuckDB-oracle
correctness checks."""
