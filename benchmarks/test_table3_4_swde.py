"""Tables 3 & 4 — SWDE four-system comparison at bench scale."""
from benchmarks.conftest import emit
from repro.eval import tables


def test_table3_swde_f1(benchmark, swde_bench_runs):
    t = benchmark.pedantic(
        lambda: tables.table3(swde_bench_runs), rounds=1, iterations=1
    )
    emit("Table 3: SWDE page-hit F1 (ours vs paper rows)", t)


def test_table4_swde_detail(benchmark, swde_bench_runs):
    t = benchmark.pedantic(
        lambda: tables.table4(swde_bench_runs), rounds=1, iterations=1
    )
    emit("Table 4: SWDE per-predicate P/R/F1 — Vertex++ vs CERES-Full", t)
