"""Table IV: Cost_Partitioning (§VII) for hash / semantic-hash / METIS-lite
on YAGO2-lite and LUBM-lite.

Writes results/table4_cost.json and prints the table.
"""
from repro.tables import RESULTS_DIR, run_cost_table, save_json


def main(spark) -> None:
    table = run_cost_table(spark)
    save_json(table, RESULTS_DIR / "table4_cost.json")
    print("Table IV — Cost_Partitioning")
    print("-" * 64)
    header = f"{'dataset':10} {'hash':>14} {'semantic':>14} {'metis':>14}"
    print(header)
    for ds, row in table.items():
        print(
            f"{ds:10} "
            f"{row['hash']['cost']:>14.3e} "
            f"{row['semantic']['cost']:>14.3e} "
            f"{row['metis']['cost']:>14.3e}"
        )
    print()
    print("crossing edges / max fragment edges:")
    for ds, row in table.items():
        for strat, c in row.items():
            print(
                f"  {ds:8} {strat:9} cut={c['n_crossing']:>7} "
                f"scatter={c['scatter']:>10.2f} maxfrag={c['max_fragment_edges']:>7}"
            )


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("table4-cost")
    main(spark)
    spark.stop()
