"""Tables 3 & 4 — SWDE comparison of all four implementations.

spark-submit jobs/table3_swde.py
"""
from jobs._common import session
from repro.eval import tables

if __name__ == "__main__":
    spark = session("table3-swde")
    runs = tables.swde_experiment(spark, n_sites=3, pages_per_site=24)
    print("== Table 3 (page-hit F1 per vertical) ==")
    print(tables.table3(runs).to_string(index=False))
    print("== Table 4 (all-mentions P/R/F1 per predicate) ==")
    print(tables.table4(runs).to_string(index=False))
