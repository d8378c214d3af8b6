"""Deterministic synthetic graph generators.

All randomness flows from a caller-supplied seed; parallel transactions
between the same pair are merged by summing amounts (``from_edges``),
matching the transaction-network semantics of the paper's use case.
"""
from __future__ import annotations

import numpy as np

from repro.core.graph import LocalGraph, from_edges


def _powerlaw_weights(n: int, alpha: float, rng: np.random.Generator) -> np.ndarray:
    """Expected-degree weights ~ Pareto(alpha-1), capped to avoid a
    degenerate hub core (caps keep clique counts tractable at our scale)."""
    w = (1.0 - rng.random(n)) ** (-1.0 / (alpha - 1.0))
    cap = max(10.0, np.sqrt(n))
    return np.minimum(w, cap)


def chung_lu_with_communities(
    n: int,
    target_m: int,
    *,
    alpha: float = 2.5,
    n_communities: int = 4,
    community_size: int = 30,
    community_p: float = 0.75,
    community_weight_boost: float = 8.0,
    seed: int = 0,
) -> LocalGraph:
    """Power-law background + planted dense (fraud) communities.

    The background is a Chung–Lu graph (endpoints sampled ∝ expected
    degree). Each planted community is a ``community_p``-dense near-clique
    whose edges carry ``community_weight_boost``× heavier transaction
    amounts — the "small groups, frequent repetitive transactions" pattern
    of Figure 2. Vertex label ``fraud_community`` maps each vertex to its
    community id (−1 for background).
    """
    rng = np.random.default_rng(seed)
    w = _powerlaw_weights(n, alpha, rng)
    p = w / w.sum()
    src = rng.choice(n, size=target_m, p=p)
    dst = rng.choice(n, size=target_m, p=p)
    amount = np.exp(rng.normal(3.0, 1.0, size=target_m))

    comm = np.full(n, -1, dtype=np.int64)
    extra_src, extra_dst, extra_amt = [src], [dst], [amount]
    members_all = rng.choice(
        n, size=min(n, n_communities * community_size), replace=False
    )
    for j in range(n_communities):
        mem = members_all[j * community_size : (j + 1) * community_size]
        if mem.size < 3:
            continue
        comm[mem] = j
        iu, iv = np.triu_indices(mem.size, k=1)
        keep = rng.random(iu.size) < community_p
        cs, cd = mem[iu[keep]], mem[iv[keep]]
        camt = np.exp(rng.normal(3.0, 1.0, size=cs.size)) * community_weight_boost
        extra_src.append(cs)
        extra_dst.append(cd)
        extra_amt.append(camt)

    g = from_edges(
        n,
        np.concatenate(extra_src),
        np.concatenate(extra_dst),
        np.concatenate(extra_amt),
        vertex_weight=rng.random(n) * 0.5,
        labels={"fraud_community": comm},
    )
    return g


def bipartite_fraud_graph(
    n_customers: int,
    n_merchants: int,
    target_m: int,
    *,
    n_fraud_blocks: int = 3,
    block_customers: int = 20,
    block_merchants: int = 8,
    block_multiplicity: float = 12.0,
    seed: int = 0,
) -> LocalGraph:
    """Customer–merchant transaction network (the Grab ``gfg`` analogue).

    Normal activity: customers transact with merchants whose popularity is
    Zipf-distributed (large, sparse legitimate communities). Fraud blocks:
    small customer×merchant groups with many repeated transactions (coupon
    abuse/collusion) — dense once parallel edges merge into summed
    amounts. Customers are ids ``0..n_customers-1``; merchants follow.
    """
    rng = np.random.default_rng(seed)
    n = n_customers + n_merchants
    ranks = np.arange(1, n_merchants + 1, dtype=np.float64)
    pz = (1.0 / ranks**1.1)
    pz /= pz.sum()
    cust = rng.integers(0, n_customers, size=target_m)
    merch = n_customers + rng.choice(n_merchants, size=target_m, p=pz)
    amount = np.exp(rng.normal(3.0, 0.8, size=target_m))

    comm = np.full(n, -1, dtype=np.int64)
    is_merchant = np.zeros(n, dtype=bool)
    is_merchant[n_customers:] = True
    srcs, dsts, amts = [cust], [merch], [amount]
    fr_c = rng.choice(n_customers, size=n_fraud_blocks * block_customers, replace=False)
    fr_m = rng.choice(n_merchants, size=n_fraud_blocks * block_merchants, replace=False)
    for j in range(n_fraud_blocks):
        bc = fr_c[j * block_customers : (j + 1) * block_customers]
        bm = n_customers + fr_m[j * block_merchants : (j + 1) * block_merchants]
        comm[bc] = j
        comm[bm] = j
        cs = np.repeat(bc, bm.size)
        cd = np.tile(bm, bc.size)
        # repeated small transactions: multiplicity × small amounts
        camt = block_multiplicity * np.exp(rng.normal(2.0, 0.5, size=cs.size))
        srcs.append(cs)
        dsts.append(cd)
        amts.append(camt)

    return from_edges(
        n,
        np.concatenate(srcs),
        np.concatenate(dsts),
        np.concatenate(amts),
        vertex_weight=rng.random(n) * 0.5,
        labels={"fraud_community": comm, "is_merchant": is_merchant},
    )
