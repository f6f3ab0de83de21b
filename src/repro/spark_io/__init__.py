"""Spark-side physical layout: partitioned Parquet writes + BID routing."""
