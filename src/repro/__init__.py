"""PySpark reproduction of PathEnum (SIGMOD 2021): index-based
hop-constrained s-t path enumeration as Catalyst dataflows."""
