"""Work/span accounting emitted by every peeling run.

The paper's runtime tables are wall-clock on a 128-thread machine over
billion-edge graphs — hardware and scale this container does not have.
Every engine therefore records *what work happened* (vertices scanned,
weight updates applied, per round) and ``repro.simmachine`` converts the
log into seconds under a machine profile. Sequential records are
span-bound: they cannot be sped up by threads.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class RoundRecord:
    """One peeling (or trimming) round."""

    scanned: int  # vertices examined against the threshold this round
    updates: int  # weight updates (half-edges / clique memberships) applied
    peeled: int  # vertices removed this round
    phase: str = "peel"  # "peel" | "trim"
    sequential: bool = False  # True -> this round's work is span-bound
    bucket: bool = False  # True -> round is a bucket pop (cheap sync)

    @property
    def work(self) -> int:
        return self.scanned + self.updates


@dataclass
class WorkLog:
    """Full accounting for one algorithm run on one graph."""

    n: int
    m: int
    init_work: float = 0.0  # parallelizable setup (e.g. clique enumeration)
    init_sequential: float = 0.0  # span-bound setup
    rounds: list[RoundRecord] = field(default_factory=list)

    def add(self, scanned: int, updates: int, peeled: int, phase: str = "peel",
            sequential: bool = False, bucket: bool = False) -> None:
        self.rounds.append(
            RoundRecord(
                int(scanned), int(updates), int(peeled), phase, sequential,
                bucket,
            )
        )

    @property
    def n_rounds(self) -> int:
        return len(self.rounds)

    @property
    def total_work(self) -> float:
        return self.init_work + self.init_sequential + sum(
            r.work for r in self.rounds
        )
