"""Table I: per-stage evaluation of LQ1–LQ7 on LUBM-lite (hash, 8 sites).

Usage: spark-submit jobs/table1_lubm.py   (or plain `python jobs/table1_lubm.py`)
Writes results/table1_lubm.json and prints the table.
"""
from repro.tables import (
    RESULTS_DIR,
    format_stage_table,
    run_stage_table,
    save_metrics,
)


def main(spark) -> None:
    metrics = run_stage_table(spark, "lubm")
    save_metrics(metrics, RESULTS_DIR / "table1_lubm.json")
    print(format_stage_table(metrics, "Table I — LUBM-lite (hash, 8 fragments)"))


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("table1-lubm")
    main(spark)
    spark.stop()
