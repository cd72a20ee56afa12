"""Logical-plan substrate: operator DAGs, catalogs, cardinalities, subQ
partitioning, and TPC-H-lite / TPC-DS-lite query templates."""
