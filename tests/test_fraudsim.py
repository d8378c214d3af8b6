"""Tests for the transaction-stream / prevention-ratio substrate."""
import numpy as np
import pytest

from repro.fraudsim import generate_stream, prevention_ratio
from repro.simmachine import TIME_LIMIT_S


@pytest.fixture(scope="module")
def stream():
    return generate_stream(n_communities=200, edges_per_community=100, seed=1)


def test_stream_deterministic():
    a = generate_stream(seed=5)
    b = generate_stream(seed=5)
    assert np.array_equal(a.arrival_s, b.arrival_s)


def test_stream_shapes(stream):
    assert stream.n_edges == 200 * 100
    assert stream.burst_start_s.shape == (200,)
    assert stream.burst_dur_s.shape == (200,)
    assert (stream.burst_dur_s > 0).all()


def test_arrivals_inside_bursts(stream):
    lo = stream.burst_start_s[stream.community]
    hi = lo + stream.burst_dur_s[stream.community]
    assert (stream.arrival_s >= lo).all()
    assert (stream.arrival_s <= hi).all()


def test_prevention_in_unit_interval(stream):
    for lat in (0.0, 1.0, 60.0, 600.0, 7000.0):
        r = prevention_ratio(stream, lat)
        assert 0.0 <= r <= 1.0


def test_prevention_monotone_decreasing(stream):
    lats = [0.0, 3.0, 30.0, 200.0, 1000.0, 6000.0]
    ratios = [prevention_ratio(stream, lat) for lat in lats]
    for a, b in zip(ratios, ratios[1:]):
        assert b <= a + 1e-12


def test_zero_latency_bounded_by_detectable_fraction(stream):
    # even an instant detector misses the edges before detectability
    r = prevention_ratio(stream, 0.0)
    assert r <= 1.0 - 0.04  # detectable fraction is 5%


def test_tle_prevents_nothing(stream):
    assert prevention_ratio(stream, TIME_LIMIT_S) == 0.0
    assert prevention_ratio(stream, TIME_LIMIT_S + 5) == 0.0


def test_seconds_scale_separates_systems(stream):
    """A seconds-scale detector (Dupin) must far outperform a
    hundreds-of-seconds one (Spade) and a thousands one (GBBS)."""
    r_dupin = prevention_ratio(stream, 4.0)
    r_spade = prevention_ratio(stream, 200.0)
    r_gbbs = prevention_ratio(stream, 6000.0)
    assert r_dupin > r_spade > r_gbbs
    assert r_dupin > 0.8
    assert r_gbbs < 0.1


def test_detectable_fraction_knob(stream):
    strict = prevention_ratio(stream, 1.0, detectable_fraction=0.5)
    loose = prevention_ratio(stream, 1.0, detectable_fraction=0.01)
    assert loose > strict
