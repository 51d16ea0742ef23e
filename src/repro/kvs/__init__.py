"""Simulated distributed key-value store substrate (replaces the paper's
Apache Cassandra cluster; see DESIGN §2 for the substitution argument)."""
