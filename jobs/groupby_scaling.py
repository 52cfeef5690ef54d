"""Fig. 7 reproduction: distributed GROUP BY — runtime vs cluster size and
vs key multiplicity (Spark lowering).

Run: spark-submit jobs/groupby_scaling.py
Env: REPRO_ROWS (default 2**20), REPRO_REPEAT.
"""
import os

from repro.experiments import fig7_groupby, format_table
from repro.spark_session import get_session


def main() -> None:
    n_rows = int(os.environ.get("REPRO_ROWS", 1 << 20))
    repeat = int(os.environ.get("REPRO_REPEAT", 3))
    spark = get_session("fig7")
    print(format_table(
        fig7_groupby(spark, n_rows, repeat=repeat),
        f"Fig 7 — distributed GROUP BY scaling ({n_rows} rows)",
    ))


if __name__ == "__main__":
    main()
