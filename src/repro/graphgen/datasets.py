"""Scaled-down analogues of the paper's Table 4 datasets.

Each spec preserves the paper dataset's *relative* vertex/edge ordering
and average degree (DESIGN.md §3); ``paper_v`` / ``paper_e`` carry the
original sizes so simmachine can extrapolate work logs back to paper
scale. ``scale`` shrinks a dataset further (tests use 0.1; the clique
tables use 0.25 to keep 4-clique enumeration tractable).
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache

from repro.core.graph import LocalGraph
from repro.graphgen.generators import bipartite_fraud_graph, chung_lu_with_communities


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    n: int  # synthetic vertex count at scale=1
    avg_degree: float
    paper_v: int
    paper_e: int
    kind: str  # "social" | "bipartite" | "dense"
    seed: int

    @property
    def target_m(self) -> int:
        return int(self.n * self.avg_degree / 2)


DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("gfg", 3_000, 17, 3_646_185, 28_635_763, "bipartite", 11),
        DatasetSpec("soc", 20_000, 18, 28_504_110, 531_000_244, "social", 12),
        DatasetSpec("uk", 28_000, 24, 39_454_748, 936_364_284, "social", 13),
        DatasetSpec("rv", 30_000, 35, 41_652_230, 1_468_365_182, "social", 14),
        DatasetSpec("kron", 1_500, 58, 1_544_088, 91_042_012, "dense", 15),
        DatasetSpec("sk", 36_000, 38, 50_636_151, 1_949_412_601, "social", 16),
        DatasetSpec("la", 38_000, 37, 52_579_682, 1_963_263_821, "social", 17),
        DatasetSpec("bio", 1_500, 22, 1_508_587, 32_761_889, "social", 18),
    ]
}


@lru_cache(maxsize=32)
def load_dataset(name: str, scale: float = 1.0) -> LocalGraph:
    """Build (and memoize) a named dataset at the given scale."""
    spec = DATASETS[name]
    n = max(60, int(spec.n * scale))
    m = max(120, int(spec.target_m * scale))
    n_comm = 4 if scale >= 0.5 else 2
    csize = max(8, int(30 * min(1.0, scale * 2)))
    if spec.kind == "bipartite":
        n_cust = int(n * 0.8)
        return bipartite_fraud_graph(
            n_cust,
            n - n_cust,
            m,
            n_fraud_blocks=n_comm,
            block_customers=max(6, csize // 2),
            block_merchants=max(3, csize // 5),
            seed=spec.seed,
        )
    alpha = 2.1 if spec.kind == "dense" else 2.5
    return chung_lu_with_communities(
        n,
        m,
        alpha=alpha,
        n_communities=n_comm,
        community_size=csize,
        seed=spec.seed,
    )
