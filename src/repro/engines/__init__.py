"""Comparator engines for the TPC-H evaluation (paper Fig. 9).

* ``presto_sim`` — a generic *interpreted* SQL engine: the same logical
  plans executed row-at-a-time through the Volcano interpreter inside the
  same distributed stages. Stands in for Presto (per-row dispatch, no
  compilation) — the paper's 6–9x gap is interpretation vs compilation.
* ``memsql_sim`` — a specialized *compiled* in-memory SQL engine: native
  Spark SQL (Catalyst + whole-stage codegen) over cached tables with
  broadcast joins enabled. Stands in for MemSQL.
"""
from repro.engines.presto_sim import run_presto_sim  # noqa: F401
from repro.engines.memsql_sim import MemSqlSim  # noqa: F401
