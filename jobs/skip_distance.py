"""T9 (Fig. 4c): Exit-Frame-Sampler skip distance vs F1 and runtime
ratio, from an S6 run with an extended skip cap.

    spark-submit jobs/skip_distance.py --scenes 4 --frames 240 --max-skip 13
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.experiments_compare import skip_distance_table
from repro.world.datasets import nuscenes_lite


def main(argv=None):
    p = base_parser("EFS skip-distance sweep")
    p.add_argument("--max-skip", type=int, default=13)
    args = p.parse_args(argv)
    spark = job_session("skip_distance")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
    print_table(
        "T9: skip distance vs F1 / runtime ratio",
        skip_distance_table(spark, ds, max_skip=args.max_skip),
    )


if __name__ == "__main__":
    main()
