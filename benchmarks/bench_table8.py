"""Benchmark + reproduction harness for Table 8 (density, TDS/kCLiDS)."""
from repro.experiments import write_table
from repro.experiments.tables import CLIQUE_METRICS, table8


def test_bench_table8(benchmark):
    rows = benchmark.pedantic(lambda: table8(scale=0.25), rounds=1, iterations=1)
    write_table("table8", rows, "Table 8 — density, TDS/kCLiDS")
    for ds in {r["Dataset"] for r in rows}:
        sub = {r["Method"]: r for r in rows if r["Dataset"] == ds}
        for m in CLIQUE_METRICS:
            # Dupin within ~20% of the sequential-quality baselines
            # (paper: 6.97% below kCLIST on average, better on some sets)
            ref = float(sub["kCLIST"][m])
            got = float(sub["Dupin"][m])
            if ref > 0:
                assert got >= 0.8 * ref