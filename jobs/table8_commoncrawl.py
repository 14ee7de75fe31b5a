"""Tables 8 & 9 — CommonCrawl-like long-tail extraction.

spark-submit jobs/table8_commoncrawl.py
"""
from jobs._common import session
from repro.eval import tables

if __name__ == "__main__":
    spark = session("table8-commoncrawl")
    run = tables.commoncrawl_experiment(spark, pages_base=14)
    print("== Table 8 (per-site results @ 0.5 confidence) ==")
    print(tables.table8(run).to_string(index=False))
    print("== Table 9 (top predicates) ==")
    print(tables.table9(run).to_string(index=False))
