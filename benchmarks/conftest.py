"""Bench-scale experiments, shared across table benchmarks.

The experiments (annotate → train → extract) run once per session in
fixtures; each table benchmark then times its table assembly and prints
the rows so ``bench_output.txt`` carries the reproduced tables.
"""
import pytest

from repro.eval import tables

SWDE_SCALE = dict(n_sites=3, pages_per_site=20, baseline_pair_budget=60_000)
IMDB_SCALE = dict(n_film_pages=32, n_person_pages=20, n_episode_pages=10)
CC_SCALE = dict(pages_base=10)


@pytest.fixture(scope="session")
def swde_bench_runs(spark):
    return tables.swde_experiment(spark, **SWDE_SCALE)


@pytest.fixture(scope="session")
def imdb_bench_run(spark):
    return tables.imdb_experiment(spark, **IMDB_SCALE)


@pytest.fixture(scope="session")
def cc_bench_run(spark):
    return tables.commoncrawl_experiment(spark, **CC_SCALE)


def emit(name: str, frame) -> None:
    print(f"\n== {name} ==")
    print(frame.to_string(index=False))
