"""T6 (Fig. 14): optimal #fragments vs number of repetitions.

Derives the intervals from the measured Fig. 11 rows (jobs/out/
fig11.json); if absent, runs the Fig. 11 measurement first.

    spark-submit jobs/table_fig14_amortization.py
"""
import argparse

from _common import get_spark, load_rows, save_rows, scratch_dir

from repro.experiments import fig11_tpch, fig14_amortization as f14
from repro.experiments.common import BENCH_TPCH_SF, tpch_dataset


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=BENCH_TPCH_SF)
    args = ap.parse_args()
    fig11_rows = load_rows("fig11")
    if fig11_rows is None:
        spark = get_spark("fig14")
        ds = tpch_dataset(spark, scratch_dir("fig14_"), sf=args.sf)
        fig11_rows = fig11_tpch.run(spark, ds)
        save_rows("fig11", fig11_rows)
        spark.stop()
    rows = f14.run_from_fig11(fig11_rows)
    print(f14.format_table(rows))
    print("saved:", save_rows("fig14", rows))


if __name__ == "__main__":
    main()
