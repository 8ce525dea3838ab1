"""T2+T3 (Fig. 12): capture-optimization micro-benchmarks.

    spark-submit jobs/table_fig12_capture_opts.py [--sf 0.05]
"""
import argparse

from _common import get_spark, save_rows, scratch_dir

from repro.experiments import fig12_capture_opts as f12
from repro.experiments.common import BENCH_CRIMES_SF, crimes_dataset


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=BENCH_CRIMES_SF)
    args = ap.parse_args()
    spark = get_spark("fig12")
    ds = crimes_dataset(spark, scratch_dir("fig12_"), sf=args.sf)
    init_rows = f12.run_init(spark, ds)
    print(f12.format_init_table(init_rows))
    print()
    merge_rows = f12.run_merge(spark, ds)
    print(f12.format_merge_table(merge_rows))
    print("saved:", save_rows("fig12a", init_rows), save_rows("fig12b", merge_rows))
    spark.stop()


if __name__ == "__main__":
    main()
