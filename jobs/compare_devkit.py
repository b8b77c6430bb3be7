"""T4 (Fig. 5a, nuScenes devkit): query-engine wall-clock, Spark vs the
naive pure-Python devkit evaluation, on identical annotations.

    spark-submit jobs/compare_devkit.py --scenes 4 --frames 240
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.experiments_compare import devkit_comparison
from repro.world.datasets import nuscenes_lite


def main(argv=None):
    args = base_parser("Query engine vs nuScenes devkit").parse_args(argv)
    spark = job_session("compare_devkit")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
    print_table("T4: Spark query engine vs devkit (wall-clock s)",
                devkit_comparison(spark, ds))


if __name__ == "__main__":
    main()
