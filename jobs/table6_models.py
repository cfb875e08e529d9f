"""Table 6: impact of the embedding model family (GloVe / word2vec /
fastText stand-ins).

    spark-submit jobs/table6_models.py
"""
from repro.experiments import format_table, table6_rows


def main() -> str:
    return format_table(table6_rows(),
                        "Table 6 — Impact of embedding model (F1 %)")


if __name__ == "__main__":
    print(main())
