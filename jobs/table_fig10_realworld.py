"""T7 (Fig. 10): PBDS on the crimes / movies / Stack Overflow workloads.

    spark-submit jobs/table_fig10_realworld.py
"""
import argparse

from _common import get_spark, save_rows, scratch_dir

from repro.experiments import fig10_realworld as f10
from repro.experiments.common import (
    BENCH_CRIMES_SF,
    BENCH_MOVIES_SF,
    BENCH_SOF_SF,
    crimes_dataset,
    movies_dataset,
    sof_dataset,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--crimes-sf", type=float, default=BENCH_CRIMES_SF)
    ap.add_argument("--movies-sf", type=float, default=BENCH_MOVIES_SF)
    ap.add_argument("--sof-sf", type=float, default=BENCH_SOF_SF)
    ap.add_argument("--reps", type=int, default=3)
    args = ap.parse_args()
    spark = get_spark("fig10")
    base = scratch_dir("fig10_")
    ds_c = crimes_dataset(spark, base + "/crimes", sf=args.crimes_sf)
    ds_m = movies_dataset(spark, base + "/movies", sf=args.movies_sf)
    ds_s = sof_dataset(spark, base + "/sof", sf=args.sof_sf)
    rows = f10.run(spark, ds_c, ds_m, ds_s, reps=args.reps)
    print(f10.format_table(rows))
    print("saved:", save_rows("fig10", rows))
    spark.stop()


if __name__ == "__main__":
    main()
