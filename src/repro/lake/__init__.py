"""Data-lake substrate: catalog, Parquet metadata, lake generator."""
