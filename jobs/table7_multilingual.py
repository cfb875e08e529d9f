"""Table 7: multilingual ER — English vs synthetically-translated Spanish.

    spark-submit jobs/table7_multilingual.py
"""
from repro.experiments import format_table, table7_rows


def main() -> str:
    return format_table(table7_rows(),
                        "Table 7 — Multilingual ER (F1 %)")


if __name__ == "__main__":
    print(main())
