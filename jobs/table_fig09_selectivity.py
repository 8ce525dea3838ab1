"""T1 (Fig. 9): TPC-H provenance-sketch selectivity.

    spark-submit jobs/table_fig09_selectivity.py [--sf 0.05]
"""
import argparse

from _common import get_spark, save_rows, scratch_dir

from repro.experiments import fig09_selectivity
from repro.experiments.common import BENCH_TPCH_SF, tpch_dataset


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=BENCH_TPCH_SF)
    ap.add_argument("--fragments", type=int, nargs="+", default=[32, 400, 4000])
    args = ap.parse_args()
    spark = get_spark("fig09")
    ds = tpch_dataset(spark, scratch_dir("fig09_"), sf=args.sf)
    rows = fig09_selectivity.run(spark, ds, n_frags=tuple(args.fragments))
    print(fig09_selectivity.format_table(rows))
    print("saved:", save_rows("fig09", rows))
    spark.stop()


if __name__ == "__main__":
    main()
