"""Versioned-dataset substrate: version graphs, synthetic generators,
membership computation. This is the data model RStore manages (§2.1)."""
