"""TPC-H queries as sub-operator plans (paper Section 4.4)."""
from repro.queries.tpch import QUERIES, TpchQuery  # noqa: F401
