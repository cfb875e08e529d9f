"""Table 5: impact of the word-embedding dictionary (GloVe-840B-like vs
GloVe-Wiki-like, with vocabulary retrofitting for OOV words).

    spark-submit jobs/table5_dictionaries.py
"""
from repro.experiments import format_table, table5_rows


def main() -> str:
    return format_table(table5_rows(),
                        "Table 5 — Impact of embedding dictionary (F1 %)")


if __name__ == "__main__":
    print(main())
