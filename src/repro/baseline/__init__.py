"""Baselines the paper compares against: a general-purpose analytics
back-end (Spark SQL through Catalyst, §7.1) and a general-purpose
in-memory database system (DuckDB, §7.2.1)."""
