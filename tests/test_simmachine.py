"""Tests for the machine-cost simulator substrate."""
import pytest

from repro.core.worklog import WorkLog
from repro.simmachine import (
    EPYC_7742,
    TIME_LIMIT_S,
    X5650,
    MachineProfile,
    aggregates,
    clique_exponent,
    extrapolate,
    simulate,
)


def _log(par_rounds=0, seq_rounds=0, bucket_rounds=0, work=1000,
         init_par=0.0, init_seq=0.0):
    log = WorkLog(n=100, m=400, init_work=init_par, init_sequential=init_seq)
    for _ in range(par_rounds):
        log.add(work, 0, 1)
    for _ in range(seq_rounds):
        log.add(work, 0, 1, sequential=True)
    for _ in range(bucket_rounds):
        log.add(work, 0, 1, bucket=True)
    return log


def test_aggregates_partition_rounds():
    ag = aggregates(_log(par_rounds=3, seq_rounds=2, bucket_rounds=5))
    assert ag.n_par_rounds == 3
    assert ag.n_bucket_rounds == 5
    assert ag.par_work == 8 * 1000  # par + bucket rounds
    assert ag.seq_work == 2 * 1000


def test_parallel_beats_sequential_same_work():
    par = simulate(_log(par_rounds=1, work=10_000_000), X5650)
    seq = simulate(_log(seq_rounds=1, work=10_000_000), X5650)
    assert par < seq


def test_simulate_monotone_in_work():
    a = simulate(_log(par_rounds=1, work=1_000), X5650)
    b = simulate(_log(par_rounds=1, work=1_000_000), X5650)
    assert b > a


def test_rounds_cost_sync():
    few = simulate(_log(par_rounds=1, work=0), X5650)
    many = simulate(_log(par_rounds=1000, work=0), X5650)
    assert many == pytest.approx(few * 1000)


def test_bucket_sync_cheaper_than_barrier():
    barrier = simulate(_log(par_rounds=100, work=0), X5650)
    buckets = simulate(_log(bucket_rounds=100, work=0), X5650)
    assert buckets < barrier


def test_epyc_faster_than_x5650():
    log = _log(par_rounds=10, seq_rounds=2, work=5_000_000)
    assert simulate(log, EPYC_7742) < simulate(log, X5650)


def test_epyc_parallel_gain_exceeds_sequential_gain():
    """The Table 10 effect: parallel-bound workloads speed up ~2.2x on the
    EPYC, span-bound ones only ~1.1x."""
    par = _log(par_rounds=1, work=10_000_000)
    seq = _log(seq_rounds=1, work=10_000_000)
    par_gain = simulate(par, X5650) / simulate(par, EPYC_7742)
    seq_gain = simulate(seq, X5650) / simulate(seq, EPYC_7742)
    assert par_gain > 2.0
    assert seq_gain < 1.3


def test_extrapolate_scales_work_linearly_for_edge_metrics():
    log = _log(par_rounds=2, work=1000)
    ag = extrapolate(log, synth_v=100, synth_e=400, paper_v=100, paper_e=4000)
    assert ag.par_work == pytest.approx(2 * 1000 * 10)


def test_extrapolate_round_growth_modes():
    log = _log(bucket_rounds=10)
    lin = extrapolate(log, synth_v=100, synth_e=400, paper_v=10_000,
                      paper_e=400, round_growth="linear")
    sq = extrapolate(log, synth_v=100, synth_e=400, paper_v=10_000,
                     paper_e=400, round_growth="sqrt")
    lg = extrapolate(log, synth_v=100, synth_e=400, paper_v=10_000,
                     paper_e=400, round_growth="log")
    assert lin.n_bucket_rounds == pytest.approx(10 * 100)
    assert sq.n_bucket_rounds == pytest.approx(10 * 10)
    assert lg.n_bucket_rounds == pytest.approx(10 * 2)
    with pytest.raises(ValueError):
        extrapolate(log, synth_v=1, synth_e=1, paper_v=1, paper_e=1,
                    round_growth="bogus")


def test_extrapolate_clique_superlinear():
    log = _log(par_rounds=1, work=1000, init_par=500)
    e3 = extrapolate(log, synth_v=100, synth_e=400, paper_v=100,
                     paper_e=40_000, clique_k=3)
    assert e3.init_par == pytest.approx(500 * 100**1.25)
    assert e3.par_work == pytest.approx(1000 * 100**1.25)


def test_clique_exponent_values():
    assert clique_exponent(None) == 1.0
    assert clique_exponent(3) == 1.25
    assert clique_exponent(4) == 1.3
    assert clique_exponent(6) == 1.3


def test_time_limit_constant():
    assert TIME_LIMIT_S == 7200.0


def test_profile_fields():
    p = MachineProfile("x", 4, 1e6, 1e6, 1e-6, 1e-7)
    assert simulate(_log(par_rounds=1, work=4_000_000), p) == pytest.approx(
        1.0 + 1e-6
    )
