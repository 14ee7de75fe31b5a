"""Tables 8 & 9 — CommonCrawl long-tail extraction at bench scale."""
from benchmarks.conftest import emit
from repro.eval import tables


def test_table8_commoncrawl(benchmark, cc_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table8(cc_bench_run), rounds=1, iterations=1
    )
    emit("Table 8: per-site results @ 0.5 confidence (ours vs paper precision)", t)


def test_table9_predicates(benchmark, cc_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table9(cc_bench_run), rounds=1, iterations=1
    )
    emit("Table 9: most-extracted predicates (ours vs paper)", t)
