"""Figure 10/12-shaped blocking sweeps (bonus beyond the numbered tables):
pair completeness / reduction ratio vs K and L, and multi-probe recall.

    spark-submit jobs/blocking_sweep.py
"""
from repro.experiments import blocking_sweep_rows, format_table, multiprobe_rows


def main() -> str:
    out = format_table(blocking_sweep_rows(),
                       "Blocking sweep — PC/RR vs K and L (Fig. 10 shape)")
    out += "\n" + format_table(multiprobe_rows(),
                               "Multi-probe LSH recall, K=10 L=1 (Fig. 12 shape)")
    return out


if __name__ == "__main__":
    print(main())
