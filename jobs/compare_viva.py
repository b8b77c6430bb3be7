"""T3 (Fig. 5a, VIVA): Q9 at 360x240 @ 1 FPS with DeepSORT, on both the
VIVA-style dataset (jackson_lite) and nuscenes_lite.

    spark-submit jobs/compare_viva.py --scenes 4 --frames 240
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

import pandas as pd

from jobs._common import base_parser, job_session, print_table
from repro.experiments_compare import viva_comparison
from repro.world.datasets import jackson_lite, nuscenes_lite


def main(argv=None):
    p = base_parser("Spatialyze vs VIVA on Q9")
    p.add_argument("--clips", type=int, default=4)
    args = p.parse_args(argv)
    spark = job_session("compare_viva")
    out = pd.concat(
        [
            viva_comparison(spark, jackson_lite(args.clips, seed=args.seed)),
            viva_comparison(
                spark, nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
            ),
        ],
        ignore_index=True,
    )
    print_table("T3: Spatialyze vs VIVA on Q9 (modeled seconds)", out)


if __name__ == "__main__":
    main()
