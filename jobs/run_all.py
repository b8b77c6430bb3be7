"""Generate every evaluation table (T2-T10) in one session and write the
results to ``results/`` as CSVs plus a combined text report.

    spark-submit jobs/run_all.py --scenes 4 --frames 144
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

import time

from jobs._common import base_parser, job_session, print_table
from repro.baselines.otif import OTIF_TRAINING_MS
from repro.experiments import (
    SETUPS,
    ablation_accuracy_table,
    ablation_runtime_table,
    run_setup,
    stage_breakdown,
)
from repro.experiments_compare import (
    devkit_comparison,
    eva_comparison,
    otif_comparison,
    skip_distance_table,
    skyquery_comparison,
    viva_comparison,
)
from repro.world.datasets import jackson_lite, nuscenes_lite, skyquery_lite


def main(argv=None):
    p = base_parser("Generate all evaluation tables")
    p.add_argument("--out", default="results")
    p.add_argument("--max-skip", type=int, default=20)
    args = p.parse_args(argv)
    os.makedirs(args.out, exist_ok=True)
    spark = job_session("run_all")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)

    def save(name, df):
        df.to_csv(os.path.join(args.out, f"{name}.csv"), index=False)
        print_table(name, df)

    t0 = time.time()
    # T7/T8: ablation (Q4 shares Q3's plan; the paper skips it too in 7.2.1).
    runs = {}
    for q in ("Q1", "Q2", "Q3", "Q4"):
        for s in SETUPS:
            runs[(q, s)] = run_setup(spark, ds, q, s)
            print(f"[{time.time() - t0:7.1f}s] {q}/{s}: "
                  f"{runs[(q, s)].cost.total_ms:.0f} ms modeled", flush=True)
    save("T7_ablation_runtime", ablation_runtime_table(runs, n_videos=args.scenes))
    save("T8_ablation_accuracy", ablation_accuracy_table(runs))
    # T10: stage breakdown.
    save("T10_stage_breakdown", stage_breakdown(spark, ds))
    # T2: EVA.
    save("T2_eva", eva_comparison(spark, ds))
    # T3: VIVA.
    import pandas as pd

    save(
        "T3_viva",
        pd.concat(
            [
                viva_comparison(spark, jackson_lite(24, seed=args.seed)),
                viva_comparison(spark, ds),
            ],
            ignore_index=True,
        ),
    )
    # T4: devkit.
    save("T4_devkit", devkit_comparison(spark, ds))
    # T5: OTIF.
    save("T5_otif", otif_comparison(spark, ds))
    print(f"OTIF training (reported, not counted): {OTIF_TRAINING_MS / 60000:.0f} min")
    # T6: SkyQuery.
    save("T6_skyquery", skyquery_comparison(spark, skyquery_lite(seed=args.seed, n_frames=720)))
    # T9: skip distance.
    save("T9_skip_distance", skip_distance_table(spark, ds, max_skip=args.max_skip))
    print(f"\nall tables done in {time.time() - t0:.0f}s")


if __name__ == "__main__":
    main()
