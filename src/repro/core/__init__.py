"""RStore's contribution: chunk partitioning algorithms, indexes, query
processing, sub-chunk compression, and online partitioning (§2.4–§4)."""
