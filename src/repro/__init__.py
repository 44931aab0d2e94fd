"""PySpark reproduction of "COMPARE: Accelerating Groupwise Comparison
in Relational Databases for Data Analytics" (VLDB 2021)."""

__version__ = "0.1.0"
