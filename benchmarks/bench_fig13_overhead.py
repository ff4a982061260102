"""Fig 13 / §6.4 benchmark: configuration overhead, staircase vs exhaustive
and coalescing vs set-partition enumeration."""
import time

from benchmarks.conftest import one_shot
from repro.core.consumption import (
    derive_consumption_format,
    exhaustive_consumption_format,
)
from repro.core.storage import derive_storage_plan, enumerate_storage_plan
from repro.ops.library import ACCURACY_LEVELS, OPERATORS, QUERY_B
from repro.profiler.consumption import ConsumptionProfiler
from repro.profiler.storage import StorageProfiler
from repro.video.datasets import DATASETS, PROFILING_DATASET


def test_bench_fig13_staircase_vs_exhaustive(benchmark):
    def run():
        totals = {}
        for name, op in OPERATORS.items():
            ds = DATASETS[PROFILING_DATASET[op.query]]
            p = ConsumptionProfiler(ds, mode="local")
            e = ConsumptionProfiler(ds, mode="local")
            for acc in sorted(ACCURACY_LEVELS, reverse=True):
                derive_consumption_format(p, op, acc)
                exhaustive_consumption_format(e, op, acc)
            totals[name] = (p.runs, e.runs)
        return totals

    totals = one_shot(benchmark, run)
    for name, (st, ex) in totals.items():
        assert ex == 600  # exhaustive profiles the whole fidelity space
        assert st * 3 < ex  # Fig 13: order-of-magnitude fewer runs


def test_bench_fig13_coalesce_vs_enumeration(benchmark, cfg):
    b_consumers = [c for c in cfg.consumers if c.op_name in QUERY_B]

    def run():
        t0 = time.time()
        greedy = derive_storage_plan(StorageProfiler(DATASETS["dashcam"]), b_consumers)
        t_g = time.time() - t0
        t0 = time.time()
        exact = enumerate_storage_plan(StorageProfiler(DATASETS["dashcam"]), b_consumers)
        t_e = time.time() - t0
        return greedy, exact, t_g, t_e

    greedy, exact, t_g, t_e = one_shot(benchmark, run)
    # §6.4: both methods land on equally storage-efficient formats
    assert abs(greedy.storage_kb_per_s() - exact.storage_kb_per_s()) < 1e-6
