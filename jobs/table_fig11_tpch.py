"""T4+T5 (Fig. 11): TPC-H runtime with sketches vs without, and the
capture overhead, on both the Parquet (disk) and cached (mem) paths.

    spark-submit jobs/table_fig11_tpch.py [--sf 0.05] [--reps 3]
"""
import argparse

from _common import get_spark, save_rows, scratch_dir

from repro.experiments import fig11_tpch
from repro.experiments.common import BENCH_TPCH_SF, tpch_dataset


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=BENCH_TPCH_SF)
    ap.add_argument("--reps", type=int, default=3)
    ap.add_argument("--fragments", type=int, nargs="+", default=[32, 400, 4000])
    args = ap.parse_args()
    spark = get_spark("fig11")
    ds = tpch_dataset(spark, scratch_dir("fig11_"), sf=args.sf)
    rows = fig11_tpch.run(
        spark, ds, n_frags=tuple(args.fragments), reps=args.reps
    )
    print(fig11_tpch.format_table(rows))
    print("saved:", save_rows("fig11", rows))
    spark.stop()


if __name__ == "__main__":
    main()
