"""Fig. 9 reproduction: TPC-H Q4/Q12/Q14/Q19 — Modularis (lowered
sub-operator plans) vs Presto stand-in (interpreted) vs MemSQL stand-in
(native Spark SQL over cached tables).

Run: spark-submit jobs/tpch_compare.py
Env: REPRO_SF (default 0.1), REPRO_REPEAT.
"""
import os

from repro.experiments import fig9_tpch, format_table
from repro.spark_session import get_session


def main() -> None:
    sf = float(os.environ.get("REPRO_SF", 0.1))
    repeat = int(os.environ.get("REPRO_REPEAT", 3))
    spark = get_session("fig9")
    print(format_table(
        fig9_tpch(spark, sf=sf, repeat=repeat),
        f"Fig 9 — TPC-H SF={sf}: Modularis vs Presto-sim vs MemSQL-sim",
    ))


if __name__ == "__main__":
    main()
