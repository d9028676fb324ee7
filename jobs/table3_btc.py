"""Table III: per-stage evaluation of BQ1–BQ7 on BTC-lite (hash, 8 sites).

Writes results/table3_btc.json and prints the table.
"""
from repro.tables import (
    RESULTS_DIR,
    format_stage_table,
    run_stage_table,
    save_metrics,
)


def main(spark) -> None:
    metrics = run_stage_table(spark, "btc")
    save_metrics(metrics, RESULTS_DIR / "table3_btc.json")
    print(format_stage_table(metrics, "Table III — BTC-lite (hash, 8 fragments)"))


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("table3-btc")
    main(spark)
    spark.stop()
