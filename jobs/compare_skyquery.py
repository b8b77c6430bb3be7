"""T6 (Fig. 5a, SkyQuery): Q10 FPS on the aerial dataset with the same
ML sims on both sides; the delta is the Road Visibility Pruner.

    spark-submit jobs/compare_skyquery.py --frames 720
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.experiments_compare import skyquery_comparison
from repro.world.datasets import skyquery_lite


def main(argv=None):
    args = base_parser("Aerial Q10: SkyQuery vs Spatialyze").parse_args(argv)
    spark = job_session("compare_skyquery")
    ds = skyquery_lite(seed=args.seed, n_frames=args.frames)
    print_table("T6: aerial FPS (modeled)", skyquery_comparison(spark, ds))


if __name__ == "__main__":
    main()
