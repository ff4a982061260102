"""Codec model: the paper's Fig 3 coding-knob behaviour and Table 2 anchors."""
from fractions import Fraction

import pytest

from repro.codec.model import (
    DISK_KB_PER_S,
    SPEED_ENC_COST,
    SPEED_SIZE,
    decode_speed_x,
    decoded_frames_per_s,
    encode_cost_cores,
    encoded_size_kb_per_s,
    raw_retrieval_speed_x,
    raw_size_kb_per_s,
    retrieval_speed_x,
    size_kb_per_s,
)
from repro.formats import (
    GOLDEN_CODING,
    KEYFRAME_INTERVALS,
    QUALITIES,
    RAW,
    RESOLUTIONS,
    SAMPLINGS,
    SPEED_STEPS,
    Coding,
    Fidelity,
    StorageFormat,
)

S = Fraction
GOLDEN_F = Fidelity("best", 720, S(1), 1.0)


class TestSpeedStep:
    def test_encode_speed_spread_40x(self):
        # Fig 3a: up to 40x difference in encoding speed across presets
        costs = [encode_cost_cores(GOLDEN_F, Coding(st, 250), 0.3) for st in SPEED_STEPS]
        assert costs[0] / costs[-1] == pytest.approx(40.0)

    def test_size_spread_up_to_2_5x(self):
        # Fig 3a: up to 2.5x difference in storage space
        sizes = [encoded_size_kb_per_s(GOLDEN_F, Coding(st, 250), 0.3) for st in SPEED_STEPS]
        assert sizes[-1] / sizes[0] == pytest.approx(2.5)

    def test_encode_cost_monotone_decreasing(self):
        costs = [encode_cost_cores(GOLDEN_F, Coding(st, 250), 0.3) for st in SPEED_STEPS]
        assert costs == sorted(costs, reverse=True)

    def test_size_monotone_increasing(self):
        sizes = [encoded_size_kb_per_s(GOLDEN_F, Coding(st, 250), 0.3) for st in SPEED_STEPS]
        assert sizes == sorted(sizes)

    def test_decode_faster_on_cheap_presets(self):
        speeds = [decode_speed_x(GOLDEN_F, Coding(st, 250), 1.0, 0.3) for st in SPEED_STEPS]
        assert speeds == sorted(speeds)

    def test_speed_tables_consistent(self):
        assert set(SPEED_ENC_COST) == set(SPEED_SIZE) == set(SPEED_STEPS)


class TestKeyframeInterval:
    @pytest.mark.parametrize("m", KEYFRAME_INTERVALS)
    def test_decoded_frames_formula(self, m):
        # Fig 3b chunk skipping: decoded frames/s = min(FPS, FPS*s*M)
        assert decoded_frames_per_s(S(1, 30), m) == min(30.0, m)
        assert decoded_frames_per_s(S(1), m) == 30.0

    def test_skip_speedup_up_to_6x(self):
        # sampling 1/30: M=5 decodes 5 frames/s vs 30 at M=250 => 6x
        slow = decode_speed_x(GOLDEN_F, Coding("med", 250), S(1, 30), 0.3)
        fast = decode_speed_x(GOLDEN_F, Coding("med", 5), S(1, 30), 0.3)
        assert fast / slow == pytest.approx(6.0)

    def test_no_speedup_for_full_rate_consumers(self):
        a = decode_speed_x(GOLDEN_F, Coding("med", 5), S(1), 0.3)
        b = decode_speed_x(GOLDEN_F, Coding("med", 250), S(1), 0.3)
        assert a == pytest.approx(b)

    def test_small_interval_costs_storage(self):
        sizes = [encoded_size_kb_per_s(GOLDEN_F, Coding("med", m), 0.3) for m in KEYFRAME_INTERVALS]
        assert sizes == sorted(sizes, reverse=True)


class TestSizes:
    @pytest.mark.parametrize("qa,qb", zip(QUALITIES[:-1], QUALITIES[1:]))
    def test_size_monotone_in_quality(self, qa, qb):
        a = encoded_size_kb_per_s(Fidelity(qa, 720, S(1), 1.0), GOLDEN_CODING, 0.3)
        b = encoded_size_kb_per_s(Fidelity(qb, 720, S(1), 1.0), GOLDEN_CODING, 0.3)
        assert a < b

    def test_size_monotone_in_resolution(self):
        sizes = [
            encoded_size_kb_per_s(Fidelity("good", r, S(1), 1.0), GOLDEN_CODING, 0.3)
            for r in RESOLUTIONS
        ]
        assert sizes == sorted(sizes)

    def test_size_monotone_in_sampling(self):
        sizes = [
            encoded_size_kb_per_s(Fidelity("good", 720, s, 1.0), GOLDEN_CODING, 0.3)
            for s in sorted(SAMPLINGS)
        ]
        assert sizes == sorted(sizes)

    def test_size_monotone_in_motion(self):
        # dashcam-like motion makes coding less effective (paper §6.2)
        a = encoded_size_kb_per_s(GOLDEN_F, GOLDEN_CODING, 0.15)
        b = encoded_size_kb_per_s(GOLDEN_F, GOLDEN_CODING, 0.85)
        assert b > 1.5 * a

    def test_golden_size_anchor(self):
        # Table 2b: SFg (best-720p-1-100%, 250-slowest) ~ 1393 KB/s
        kb = encoded_size_kb_per_s(GOLDEN_F, GOLDEN_CODING, 0.25)
        assert 1000 < kb < 1800

    def test_raw_200p_anchor(self):
        # Table 2b: SF3 raw best-200p-1-100% ~ 1843 KB/s
        kb = raw_size_kb_per_s(Fidelity("best", 200, S(1), 1.0))
        assert 1600 < kb < 2100

    def test_raw_much_larger_than_encoded(self):
        # coding reduces raw size by up to two orders of magnitude (§2.3)
        raw = raw_size_kb_per_s(GOLDEN_F)
        enc = encoded_size_kb_per_s(
            Fidelity("good", 720, S(1), 1.0), GOLDEN_CODING, 0.3
        )
        assert raw > 30 * enc

    def test_size_kb_per_s_dispatch(self):
        assert size_kb_per_s(GOLDEN_F, RAW, 0.3) == raw_size_kb_per_s(GOLDEN_F)
        assert size_kb_per_s(GOLDEN_F, GOLDEN_CODING, 0.3) == encoded_size_kb_per_s(
            GOLDEN_F, GOLDEN_CODING, 0.3
        )

    def test_raw_scales_with_sampling_and_crop(self):
        full = raw_size_kb_per_s(GOLDEN_F)
        half = raw_size_kb_per_s(Fidelity("best", 720, S(1, 2), 0.5))
        assert half == pytest.approx(full / 4, rel=0.1)


class TestRetrieval:
    def test_golden_decode_anchor_23x(self):
        # §6.2: decoding the golden format runs at ~23x realtime
        x = decode_speed_x(GOLDEN_F, GOLDEN_CODING, S(1), 0.25)
        assert 20 < x < 27

    def test_raw_retrieval_range(self):
        # Table 2b: raw 200p retrieval spans ~1137x (s=1) to ~34132x (s=1/30)
        f = Fidelity("best", 200, S(1), 1.0)
        assert 900 < raw_retrieval_speed_x(f, S(1)) < 1300
        assert 25_000 < raw_retrieval_speed_x(f, S(1, 30)) < 40_000

    def test_raw_retrieval_reciprocal_in_sampling(self):
        f = Fidelity("best", 200, S(1), 1.0)
        assert raw_retrieval_speed_x(f, S(1, 30)) == pytest.approx(
            30 * raw_retrieval_speed_x(f, S(1))
        )

    def test_raw_consumer_cannot_read_more_than_stored(self):
        f = Fidelity("best", 200, S(1, 30), 1.0)
        assert raw_retrieval_speed_x(f, S(1)) == pytest.approx(
            raw_retrieval_speed_x(f, S(1, 30))
        )

    def test_retrieval_dispatch(self):
        raw_sf = StorageFormat(Fidelity("best", 200, S(1), 1.0), RAW)
        enc_sf = StorageFormat(GOLDEN_F, GOLDEN_CODING)
        assert retrieval_speed_x(raw_sf, S(1), 0.3) == raw_retrieval_speed_x(
            raw_sf.fidelity, S(1)
        )
        assert retrieval_speed_x(enc_sf, S(1), 0.3) == decode_speed_x(
            GOLDEN_F, GOLDEN_CODING, S(1), 0.3
        )

    def test_decode_speed_monotone_in_resolution(self):
        speeds = [
            decode_speed_x(Fidelity("good", r, S(1), 1.0), Coding("med", 50), 1.0, 0.3)
            for r in RESOLUTIONS
        ]
        assert speeds == sorted(speeds, reverse=True)

    def test_disk_bandwidth_positive(self):
        assert DISK_KB_PER_S > 1e6


class TestIngestCost:
    def test_raw_nearly_free(self):
        # bypass skips the encoder (§2.3 coding bypass)
        assert encode_cost_cores(GOLDEN_F, RAW, 0.3) < 0.1 * encode_cost_cores(
            GOLDEN_F, Coding("fastest", 250), 0.3
        )

    def test_motion_increases_cost(self):
        a = encode_cost_cores(GOLDEN_F, GOLDEN_CODING, 0.15)
        b = encode_cost_cores(GOLDEN_F, GOLDEN_CODING, 0.85)
        assert b > a

    def test_golden_ingest_cores_plausible(self):
        # Fig 11c: ~10 cores ingest one stream into ~4 formats; the golden
        # format at the slowest preset dominates that bill
        c = encode_cost_cores(GOLDEN_F, GOLDEN_CODING, 0.3)
        assert 3 < c < 12

    def test_cost_monotone_in_sampling(self):
        costs = [
            encode_cost_cores(Fidelity("best", 720, s, 1.0), GOLDEN_CODING, 0.3)
            for s in sorted(SAMPLINGS)
        ]
        assert costs == sorted(costs)
