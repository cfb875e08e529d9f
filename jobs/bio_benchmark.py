"""§5.2 "other domains": nucleotide-database deduplication with a
biomedical (k-mer) embedding dictionary.

    spark-submit jobs/bio_benchmark.py
"""
from repro.experiments import bio_rows, format_table


def main() -> str:
    return format_table(bio_rows(),
                        "Nucleotide dedup — DeepER vs hand-crafted ML (F1 %)")


if __name__ == "__main__":
    print(main())
