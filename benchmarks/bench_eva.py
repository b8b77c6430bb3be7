"""T2 benchmark (Fig. 5a, EVA): Q5-Q8 in series — Spatialyze vs the
EVA simulation with its materialized-UDF cache."""
import pytest

from repro.experiments_compare import eva_comparison
from repro.world.datasets import nuscenes_lite


@pytest.fixture(scope="module")
def ds():
    return nuscenes_lite(2, seed=0, n_frames=96)


def test_eva_comparison(benchmark, spark, ds):
    table = benchmark.pedantic(lambda: eva_comparison(spark, ds), rounds=1, iterations=1)
    benchmark.extra_info["table"] = table.to_dict("records")
    # Shape check: Spatialyze beats cold EVA on Q5 (paper: 2-7.3x Q5-7).
    assert table.iloc[0]["speedup"] > 1.5
