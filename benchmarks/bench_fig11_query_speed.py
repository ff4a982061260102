"""Fig 11a benchmark: query execution speed, VStore vs alternatives.

Runs the two cascades over 0.25 h of video per dataset at two accuracy
levels under all four configurations (the full 6-dataset x 4-accuracy sweep
lives in jobs/fig11_end_to_end.py) and checks the paper's ordering claims.
"""
import pytest

from benchmarks.conftest import one_shot
from repro.query.alternatives import make_provider
from repro.query.cascade import run_query
from repro.video.datasets import DATASETS

KINDS = ("vstore", "1->1", "1->N", "N->N")


@pytest.mark.parametrize("ds_name", ["jackson", "park"])
def test_bench_fig11a_query_speed(benchmark, spark, cfg, ds_name):
    ds = DATASETS[ds_name]
    providers = {k: make_provider(k, cfg, ds.motion) for k in KINDS}

    def run_all():
        return {
            (k, acc): run_query(spark, providers[k], ds, acc, hours=0.25).speed_x
            for k in KINDS
            for acc in (0.95, 0.7)
        }

    speeds = one_shot(benchmark, run_all)
    # Fig 11a orderings
    for acc in (0.95, 0.7):
        assert speeds[("vstore", acc)] > 2 * speeds[("1->N", acc)]
    assert speeds[("1->1", 0.95)] == pytest.approx(speeds[("1->1", 0.7)])
    assert speeds[("vstore", 0.7)] > speeds[("vstore", 0.95)]
