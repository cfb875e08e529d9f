"""Table 3: dataset statistics — paper vs our (scaled) synthetic datasets.

    spark-submit jobs/table3_stats.py
"""
from repro.experiments import format_table, table3_rows


def main() -> str:
    return format_table(table3_rows(scale=1.0),
                        "Table 3 — Data statistics (paper vs ours)")


if __name__ == "__main__":
    print(main())
