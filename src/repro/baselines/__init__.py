"""Baselines from the paper's evaluation (§8): the unmodified-DBMS
verbose-SQL plan, an in-DB sequential UDF, and a middleware client."""
from .middleware import compare_middleware
from .naive_sql import compare_naive_sql
from .udf import compare_udf

__all__ = ["compare_naive_sql", "compare_udf", "compare_middleware"]
