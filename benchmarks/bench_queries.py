"""T1 benchmark (Table 1): end-to-end build-filter-observe wall-clock for
representative queries, with the modeled cost recorded alongside."""
import pytest

from repro.core.queries import query
from repro.core.sflow import World
from repro.world.datasets import nuscenes_lite, skyquery_lite


@pytest.fixture(scope="module")
def nusc():
    return nuscenes_lite(2, seed=0, n_frames=96)


@pytest.fixture(scope="module")
def sky():
    return skyquery_lite(seed=0, n_frames=240)


@pytest.mark.parametrize("qname", ["Q2", "Q5", "Q9"])
def test_query_end_to_end(benchmark, spark, nusc, qname):
    def run():
        w = World.from_dataset(spark, nusc)
        w.filter(query(qname))
        return w.save_videos()

    manifest, cost = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["modeled_ms"] = cost.total_ms
    benchmark.extra_info["snippets"] = len(manifest)


def test_query_q10_aerial(benchmark, spark, sky):
    def run():
        w = World.from_dataset(spark, sky)
        w.filter(query("Q10"))
        return w.save_videos()

    manifest, cost = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["modeled_ms"] = cost.total_ms
    assert len(manifest) >= 1  # the parked bike-lane cars are found
