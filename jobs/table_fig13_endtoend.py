"""T8 (Fig. 13): end-to-end self-tuning workloads.

Streams of parameterized-template instances answered by the adaptive /
eager strategies vs No-PS, plus a selectivity sweep (parameter mean)
and an SDV sweep (parameter clustering).

    spark-submit jobs/table_fig13_endtoend.py [--n 40]
"""
import argparse

from _common import get_spark, save_rows, scratch_dir

from repro.experiments import fig13_endtoend as f13
from repro.experiments.common import (
    BENCH_CRIMES_SF,
    BENCH_SOF_SF,
    crimes_dataset,
    sof_dataset,
)
from repro.workloads import crimes as WC
from repro.workloads import sof as WS


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=40)
    ap.add_argument("--crimes-sf", type=float, default=BENCH_CRIMES_SF)
    ap.add_argument("--sof-sf", type=float, default=BENCH_SOF_SF)
    args = ap.parse_args()
    spark = get_spark("fig13")
    base = scratch_dir("fig13_")
    rows = []

    ds_c = crimes_dataset(spark, base + "/crimes", sf=args.crimes_sf)
    n_crimes = len(ds_c.pdb["crimes"])
    # selective threshold regime (~top blocks only)
    tmpl = WC.cq2_template(mean=n_crimes / 100, sdv=n_crimes / 400)
    for strategy in ("adaptive", "eager", "nops"):
        rows.append(
            f13.run_stream(
                ds_c, tmpl, lambda b: b, n_queries=args.n,
                strategy=strategy, n_frag=256, label="C-Q2(sel~low)",
            )
        )
    # low-selectivity regime: thresholds so low most blocks qualify
    tmpl_hi = WC.cq2_template(mean=n_crimes / 2000, sdv=n_crimes / 4000)
    for strategy in ("adaptive", "nops"):
        rows.append(
            f13.run_stream(
                ds_c, tmpl_hi, lambda b: b, n_queries=args.n,
                strategy=strategy, n_frag=256, label="C-Q2(sel~high)",
            )
        )

    ds_s = sof_dataset(spark, base + "/sof", sf=args.sof_sf)
    n_comments = len(ds_s.pdb["comments"])
    mean = max(10, n_comments // 1500)
    for sdv, label in ((mean / 10, "S-Q5(sdv-small)"), (mean / 2, "S-Q5(sdv-large)")):
        tmpl_s = WS.sq5_template(mean=mean, sdv=sdv, width_mean=mean / 2, width_sdv=mean / 10)
        for strategy in ("adaptive", "nops"):
            rows.append(
                f13.run_stream(
                    ds_s, tmpl_s, WS.sq5_bindings, n_queries=args.n,
                    strategy=strategy, n_frag=256, label=label,
                )
            )
    printable = [{k: v for k, v in r.items() if k != "cumulative"} for r in rows]
    print(f13.format_table(printable))
    print("saved:", save_rows("fig13", rows))
    spark.stop()


if __name__ == "__main__":
    main()
