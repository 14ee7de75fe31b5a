"""Tables 5, 6, 7 — the IMDb experiment at bench scale."""
from benchmarks.conftest import emit
from repro.eval import tables


def test_table5_imdb_extraction(benchmark, imdb_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table5(imdb_bench_run), rounds=1, iterations=1
    )
    emit("Table 5: IMDb extraction quality — CERES-Topic vs CERES-Full", t)


def test_table6_imdb_annotation(benchmark, imdb_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table6(imdb_bench_run), rounds=1, iterations=1
    )
    emit("Table 6: IMDb annotation accuracy — CERES-Topic vs CERES-Full", t)


def test_table7_topic_id(benchmark, imdb_bench_run):
    t = benchmark.pedantic(
        lambda: tables.table7(imdb_bench_run), rounds=1, iterations=1
    )
    emit("Table 7: IMDb topic identification accuracy", t)
