"""T2 (Fig. 5a, EVA): Q5-Q8 run in series, Spatialyze vs EVA-sim.

    spark-submit jobs/compare_eva.py --scenes 4 --frames 240
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.experiments_compare import eva_comparison
from repro.world.datasets import nuscenes_lite


def main(argv=None):
    args = base_parser("Spatialyze vs EVA on Q5-Q8").parse_args(argv)
    spark = job_session("compare_eva")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
    print_table("T2: Spatialyze vs EVA (modeled seconds)", eva_comparison(spark, ds))


if __name__ == "__main__":
    main()
