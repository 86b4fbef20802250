"""Dataset and query-workload generators for the Hercules evaluation."""
