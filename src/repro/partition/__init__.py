"""Graph-partitioning substrate: a balanced label-propagation
partitioner (METIS stand-in) plus partition-quality metrics."""
