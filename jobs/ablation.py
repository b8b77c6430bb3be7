"""T7 + T8 + T10: the §7.2 ablation study and §7.2.1 stage breakdown.

Runs Q1-Q4 under setups SB, S1-S6 (Fig. 5b/5c) and prints:
  * modeled video-processing runtime per video + speedup vs (SB);
  * AssA of each setup's tracks against (SB)'s tracks;
  * the unoptimized end-to-end stage breakdown.

    spark-submit jobs/ablation.py --scenes 4 --frames 240
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.experiments import (
    SETUPS,
    ablation_accuracy_table,
    ablation_runtime_table,
    run_setup,
    stage_breakdown,
)
from repro.world.datasets import nuscenes_lite

QUERIES = ["Q1", "Q2", "Q3", "Q4"]


def main(argv=None):
    p = base_parser("§7.2 ablation study")
    p.add_argument("--queries", nargs="*", default=QUERIES)
    p.add_argument("--setups", nargs="*", default=list(SETUPS))
    args = p.parse_args(argv)
    spark = job_session("ablation")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
    runs = {}
    for q in args.queries:
        for s in args.setups:
            runs[(q, s)] = run_setup(spark, ds, q, s)
            print(f"ran {q}/{s}: {runs[(q, s)].cost.total_ms:.0f} ms modeled")
    print_table(
        "T7 (Fig 5b): modeled video-processing runtime",
        ablation_runtime_table(runs, n_videos=args.scenes),
    )
    print_table("T8 (Fig 5c): AssA vs (SB)", ablation_accuracy_table(runs))
    print_table("T10 (§7.2.1): stage breakdown (SB)", stage_breakdown(spark, ds))


if __name__ == "__main__":
    main()
