"""Table II: per-stage evaluation of YQ1–YQ4 on YAGO2-lite (hash, 8 sites).

Writes results/table2_yago.json and prints the table.
"""
from repro.tables import (
    RESULTS_DIR,
    format_stage_table,
    run_stage_table,
    save_metrics,
)


def main(spark) -> None:
    metrics = run_stage_table(spark, "yago2")
    save_metrics(metrics, RESULTS_DIR / "table2_yago.json")
    print(format_stage_table(metrics, "Table II — YAGO2-lite (hash, 8 fragments)"))


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("table2-yago")
    main(spark)
    spark.stop()
