"""MemSQL stand-in: native Spark SQL over cached in-memory tables.

MemSQL in the paper is a distributed relational database that compiles SQL
to machine code and keeps data in memory. The closest in-container
equivalent is Spark SQL itself at full strength: Catalyst optimization,
whole-stage code generation, cached (in-memory columnar) input tables and
broadcast hash joins re-enabled (the session fixture disables them for the
shuffle-path experiments).
"""
from __future__ import annotations

from typing import Dict

from pyspark.sql import DataFrame, SparkSession


class MemSqlSim:
    """Registers cached views and runs query SQL with broadcast joins on."""

    def __init__(self, spark: SparkSession, tables: Dict[str, DataFrame]) -> None:
        self.spark = spark
        self._cached = []
        for name, df in tables.items():
            cached = df.cache()
            cached.count()  # warm the in-memory store, like a warm MemSQL run
            cached.createOrReplaceTempView(name)
            self._cached.append(cached)

    def run(self, sql: str) -> DataFrame:
        previous = self.spark.conf.get("spark.sql.autoBroadcastJoinThreshold")
        self.spark.conf.set("spark.sql.autoBroadcastJoinThreshold", str(10 * 1024 * 1024))
        try:
            # materialize the plan while broadcast is enabled
            df = self.spark.sql(sql)
            df.collect()
            return df
        finally:
            self.spark.conf.set("spark.sql.autoBroadcastJoinThreshold", previous)

    def close(self) -> None:
        for df in self._cached:
            df.unpersist()
