"""Fig 12 benchmark: erosion planning across storage budgets."""
from benchmarks.conftest import one_shot
from repro.core.erosion import plan_erosion

LIFESPAN = 10


def test_bench_fig12_erosion_planning(benchmark, cfg):
    plan = cfg.storage
    day_bytes = plan.storage_kb_per_s() * 86_400 * 1024

    def sweep():
        return {
            m: plan_erosion(
                plan,
                lifespan_days=LIFESPAN,
                storage_budget_bytes=m * day_bytes * LIFESPAN,
            )
            for m in (1.1, 0.85, 0.68, 0.51)
        }

    plans = one_shot(benchmark, sweep)
    ks = [plans[m].k for m in (1.1, 0.85, 0.68, 0.51)]
    assert ks[0] == 0.0  # budget above no-erosion cost -> flat line (k=0)
    assert ks == sorted(ks)  # tighter budget -> more aggressive decay
    for ep in plans.values():
        for d in ep.deleted_by_age:
            assert d.get(0, 0.0) == 0.0  # golden never eroded
