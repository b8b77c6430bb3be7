"""T3 benchmark (Fig. 5a, VIVA): Q9 at 1 FPS with DeepSORT on the
jackson_lite (VIVA-style) dataset."""
import pytest

from repro.experiments_compare import viva_comparison
from repro.world.datasets import jackson_lite


@pytest.fixture(scope="module")
def ds():
    return jackson_lite(2, seed=0, n_frames=150)


def test_viva_comparison(benchmark, spark, ds):
    table = benchmark.pedantic(lambda: viva_comparison(spark, ds), rounds=1, iterations=1)
    benchmark.extra_info["table"] = table.to_dict("records")
    assert table.iloc[0]["speedup"] > 1.0  # paper: 1.68x on VIVA's data
