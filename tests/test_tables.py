"""Integration tests for the per-table harnesses (small scales)."""
import pytest

from repro.experiments import (
    render_markdown,
    table2,
    table3,
    table4,
    table5,
    table7,
    table9,
    table10,
    write_table,
)
from repro.experiments.tables import run_system
from repro.simmachine import TIME_LIMIT_S

SMALL = ("gfg", "bio")


def test_table2_capability_matrix():
    rows = table2()
    assert len(rows) == 8
    by = {r["System"]: r for r in rows}
    assert by["Dupin"]["Pruning"] == "Yes"
    assert by["Spade"]["Parallel"] == "Sequential"
    assert "kCLiDS" in by["Dupin"]["Metrics"]
    assert by["GBBS"]["Metrics"] == "DG, DW, FD"


def test_table3_structure_and_reductions():
    rows = table3(dataset="gfg", scale=0.5)
    assert [r["Metric"] for r in rows] == ["DG", "DW", "FD"]
    for r in rows:
        assert r["Rounds with GPO"] <= r["Rounds without GPO"]
        assert r["Rounds with LPO"] <= r["Rounds without GPO"]
        assert r["% Reduction (LPO)"] >= r["% Reduction (GPO)"] - 1e-9
        assert r["Sparse vertices"] >= 0


def test_table3_dw_has_most_rounds():
    """The paper's headline: weighted buckets degenerate -> DW needs the
    most rounds without pruning."""
    rows = {r["Metric"]: r for r in table3(dataset="soc", scale=0.25)}
    assert rows["DW"]["Rounds without GPO"] > rows["DG"]["Rounds without GPO"]


def test_table4_all_datasets():
    rows = table4(scale=0.1)
    assert len(rows) == 8
    for r in rows:
        assert r["|V| (synth)"] > 0
        assert r["|E| (paper)"] > r["|E| (synth)"]


def test_table5_dupin_fastest_parallel(run_small_tables):
    rows = run_small_tables["t5"]
    for ds in SMALL:
        sub = {r["Method"]: r for r in rows if r["Dataset"] == ds}
        for m in ("DG", "DW", "FD"):
            dupin_t = float(sub["Dupin"][m])
            for other in ("PKMC", "FWA", "Spade"):
                val = sub[other][m]
                assert val == "TLE" or float(val) > dupin_t


@pytest.fixture(scope="module")
def run_small_tables():
    t5 = table5(scale=0.5, datasets=SMALL)
    t7 = table7(scale=0.5, datasets=SMALL)
    return {"t5": t5, "t7": t7}


def test_table7_densities_sane(run_small_tables):
    rows = run_small_tables["t7"]
    for r in rows:
        for m in ("DG", "DW", "FD"):
            assert float(r[m]) > 0


def test_table7_dupin_close_to_gbbs(run_small_tables):
    """Paper §6.3: Dupin trades a single-digit-to-moderate density gap for
    its speedup (GBBS ~7% denser on average; allow slack per-dataset)."""
    rows = run_small_tables["t7"]
    for ds in SMALL:
        sub = {r["Method"]: r for r in rows if r["Dataset"] == ds}
        for m in ("DG", "DW", "FD"):
            assert float(sub["Dupin"][m]) >= 0.75 * float(sub["GBBS"][m])


def test_table7_pkmc_not_above_greedy(run_small_tables):
    rows = run_small_tables["t7"]
    for ds in SMALL:
        sub = {r["Method"]: r for r in rows if r["Dataset"] == ds}
        for m in ("DG", "DW"):
            assert float(sub["PKMC"][m]) <= float(sub["Spade"][m]) * 1.001


def test_table9_shape():
    rows = table9()
    by = {r["Method"]: r for r in rows}
    assert set(by) == {"Dupin", "Spade", "GBBS"}
    # prevention: Dupin >> Spade >> GBBS for the FD production metric
    def pct(r, m):
        v = r[f"{m} R"]
        return float(v.rstrip("%")) if v not in ("TLE", "-") else -1.0

    assert pct(by["Dupin"], "FD") > pct(by["Spade"], "FD") > pct(by["GBBS"], "FD")
    assert by["GBBS"]["TDS L(s)"] == "-"
    assert float(by["Dupin"]["FD L(s)"]) < 60


def test_table10_epyc_never_slower():
    rows = table10(scale=0.5)
    for r in rows:
        for m in ("DG", "DW", "FD", "TDS", "kCLiDS"):
            x, e = r[f"{m} X5650"], r[f"{m} EPYC"]
            if x in ("-", "TLE") or e in ("-", "TLE"):
                continue
            assert float(e) <= float(x) + 1e-9


def test_run_system_cached():
    a = run_system("bio", 0.5, "DG", "Dupin")
    b = run_system("bio", 0.5, "DG", "Dupin")
    assert a is b


def test_run_system_rejects_unknown():
    with pytest.raises(KeyError):
        run_system("bio", 0.5, "DG", "Mystery")


def test_render_and_write(tmp_path, monkeypatch):
    import repro.experiments.io as io

    monkeypatch.setattr(io, "RESULTS_DIR", str(tmp_path))
    md = write_table("t2", table2(), "Table 2")
    assert "| System |" in md
    assert (tmp_path / "t2.md").exists()
    assert render_markdown([], "empty").endswith("(no rows)\n")
