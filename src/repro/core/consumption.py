"""§4.2 — Configuring consumption formats via monotone boundary search.

For a consumer <operator, target accuracy>, find the fidelity with adequate
accuracy (>= target) and the lowest consumption cost, profiling only a small
subset of the 600-option fidelity space:

1. fix image quality at its richest value (O2: quality does not affect
   consumption cost);
2. partition the remaining 3-D space along the shortest dimension (crop, 3
   values) into 2-D resolution x sampling planes;
3. in each plane, trace the *accuracy boundary* with a staircase walk that
   exploits monotonicity (O1): start at the richest corner, move toward
   cheaper options while adequate, fall back toward richer ones when not —
   O(N_res + N_sampling) probes instead of N_res * N_sampling;
4. take the min-cost boundary point across planes, then lower image quality
   while accuracy stays adequate (reducing storage cost opportunistically).

``exhaustive_consumption_format`` profiles the full space — the baseline the
paper compares against in Fig 13 (9-15x more profiling runs) and the oracle
our tests check the staircase against.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.formats import (
    CROPS,
    QUALITIES,
    RESOLUTIONS,
    SAMPLINGS,
    Fidelity,
    fidelity_space,
)
from repro.ops.base import Operator
from repro.profiler.consumption import ConsumptionProfiler, ProfileResult


@dataclass(frozen=True)
class DerivedCF:
    """A derived consumption format and its profiling bill."""

    fidelity: Fidelity
    f1: float
    speed_x: float
    profiling_runs: int  # cache-miss profiling runs this derivation caused


def _adequate(r: ProfileResult, target: float) -> bool:
    return r.f1 >= target


def derive_consumption_format(
    profiler: ConsumptionProfiler, op: Operator, target: float
) -> DerivedCF:
    """Staircase boundary search for the cheapest adequate fidelity."""
    runs0 = profiler.runs
    best_q = QUALITIES[-1]
    res_desc = sorted(RESOLUTIONS, reverse=True)
    samp_asc = sorted(SAMPLINGS)
    candidates: list[tuple[float, Fidelity, ProfileResult]] = []

    for crop in CROPS:
        # 2-D plane: rows = resolution (rich -> poor), cols = sampling
        # (poor -> rich). Accuracy is monotone up and to the right.
        j = len(samp_asc) - 1
        top = Fidelity(best_q, res_desc[0], samp_asc[j], crop)
        if not _adequate(profiler.profile(op, top), target):
            continue  # richest corner inadequate => whole plane inadequate
        for res in res_desc:
            f = Fidelity(best_q, res, samp_asc[j], crop)
            r = profiler.profile(op, f)
            if _adequate(r, target):
                # walk left: cheaper sampling while still adequate
                while j > 0:
                    f2 = Fidelity(best_q, res, samp_asc[j - 1], crop)
                    r2 = profiler.profile(op, f2)
                    if not _adequate(r2, target):
                        break
                    j, f, r = j - 1, f2, r2
            else:
                # walk right: this row's boundary sits at a richer sampling
                found = False
                while j < len(samp_asc) - 1:
                    j += 1
                    f = Fidelity(best_q, res, samp_asc[j], crop)
                    r = profiler.profile(op, f)
                    if _adequate(r, target):
                        found = True
                        break
                if not found:
                    break  # rows below are poorer still — plane exhausted
            candidates.append((r.cost, f, r))

    assert candidates, (
        f"no adequate fidelity for <{op.name}, {target}> — ground truth is the "
        "full-fidelity output, so the richest option must be adequate"
    )
    cost, f_best, r_best = min(
        candidates,
        key=lambda t: (t[0], t[1].resolution, float(t[1].sampling), t[1].crop),
    )

    # Quality post-pass: lowering quality keeps cost unchanged (O2) but cuts
    # storage cost; go as low as accuracy stays adequate.
    for q in reversed(QUALITIES[:-1]):  # good, bad, worst — richest first
        f_try = Fidelity(q, f_best.resolution, f_best.sampling, f_best.crop)
        r_try = profiler.profile(op, f_try)
        if _adequate(r_try, target):
            f_best, r_best = f_try, r_try
        else:
            break
    return DerivedCF(
        fidelity=f_best,
        f1=r_best.f1,
        speed_x=r_best.speed_x,
        profiling_runs=profiler.runs - runs0,
    )


def exhaustive_consumption_format(
    profiler: ConsumptionProfiler, op: Operator, target: float
) -> DerivedCF:
    """Profile all 600 fidelity options; the Fig 13 baseline."""
    runs0 = profiler.runs
    results = profiler.profile_many(op, list(fidelity_space()))
    adequate = [
        (r.cost, f, r)
        for f, r in zip(fidelity_space(), results)
        if _adequate(r, target)
    ]
    assert adequate
    # min cost; among equal-cost options prefer the poorest quality (storage),
    # then the deterministic knob order
    cost, f, r = min(
        adequate,
        key=lambda t: (
            t[0],
            t[1].quality_idx,
            t[1].resolution,
            float(t[1].sampling),
            t[1].crop,
        ),
    )
    return DerivedCF(
        fidelity=f, f1=r.f1, speed_x=r.speed_x, profiling_runs=profiler.runs - runs0
    )
