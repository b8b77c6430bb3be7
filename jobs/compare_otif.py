"""T5 (§7.1.4, OTIF): object-tracking FPS, OTIF vs Spatialyze S6.

    spark-submit jobs/compare_otif.py --scenes 4 --frames 240
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

from jobs._common import base_parser, job_session, print_table
from repro.baselines.otif import OTIF_TRAINING_MS
from repro.experiments_compare import otif_comparison
from repro.world.datasets import nuscenes_lite


def main(argv=None):
    args = base_parser("Tracking FPS: OTIF vs Spatialyze").parse_args(argv)
    spark = job_session("compare_otif")
    ds = nuscenes_lite(args.scenes, seed=args.seed, n_frames=args.frames)
    print_table("T5: tracking FPS (modeled)", otif_comparison(spark, ds))
    print(f"\nOTIF one-time training (reported, not counted): "
          f"{OTIF_TRAINING_MS / 60000:.0f} min")


if __name__ == "__main__":
    main()
