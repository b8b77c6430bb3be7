"""T9 benchmark (Fig. 4c): the Exit-Frame-Sampler skip-distance sweep."""
import pytest

from repro.experiments_compare import skip_distance_table
from repro.world.datasets import nuscenes_lite


@pytest.fixture(scope="module")
def ds():
    return nuscenes_lite(2, seed=0, n_frames=96)


def test_skip_distance_sweep(benchmark, spark, ds):
    table = benchmark.pedantic(
        lambda: skip_distance_table(spark, ds, max_skip=13), rounds=1, iterations=1
    )
    benchmark.extra_info["table"] = table.to_dict("records")
    assert (table["skip"] <= 13).all()
    # Runtime ratio falls with skip distance (Fig. 4c's shape).
    r = table.sort_values("skip")["runtime_ratio"].to_numpy()
    assert r[-1] < r[0]
