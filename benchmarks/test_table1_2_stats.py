"""Tables 1 & 2 — dataset and KB summaries at bench scale."""
from benchmarks.conftest import emit
from repro.eval import tables


def test_table1_swde_stats(benchmark, swde_bench_runs):
    t = benchmark.pedantic(
        lambda: tables.table1(swde_bench_runs), rounds=1, iterations=1
    )
    emit("Table 1: SWDE dataset summary (ours vs paper)", t)


def test_table2_kb_stats(benchmark, imdb_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table2(imdb_bench_run), rounds=1, iterations=1
    )
    emit("Table 2: seed KB summary (ours vs paper)", t)
