"""Spark Python DataSource V2 exposing a CIAO store with data skipping."""
from .ciao_source import CiaoDataSource, filters_to_clause_keys, register_ciao, run_query_spark

__all__ = ["CiaoDataSource", "filters_to_clause_keys", "register_ciao", "run_query_spark"]
