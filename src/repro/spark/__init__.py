"""Spark orchestration: per-partition index build/query via mapInPandas,
global top-k merge via Spark SQL, and the LRDFile Python DataSource."""
