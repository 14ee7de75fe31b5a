"""Table 1 — SWDE dataset summary. spark-submit jobs/table1_swde_stats.py"""
from jobs._common import session
from repro.eval import tables

if __name__ == "__main__":
    spark = session("table1")
    runs = tables.swde_experiment(
        spark, n_sites=3, pages_per_site=24, systems=()
    )
    print(tables.table1(runs).to_string(index=False))
