"""Table 4: DeepER vs Magellan(-lite) F1 on all six benchmark datasets.

    spark-submit jobs/table4_comparison.py

Tuple DRs are computed distributed (mapInPandas) when run under Spark.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import get_spark  # noqa: E402

from repro.experiments import format_table, table4_rows  # noqa: E402


def main(spark=None) -> str:
    return format_table(table4_rows(scale=1.0, spark=spark),
                        "Table 4 — DeepER vs Magellan (F1 %)")


if __name__ == "__main__":
    print(main(get_spark("table4")))
