"""Distributed substrate: partitioning, PARTIAL-k replication, Spark engine."""
