"""Tables 2, 5, 6, 7 — the IMDb experiment. spark-submit jobs/table5_imdb.py"""
from jobs._common import session
from repro.eval import tables

if __name__ == "__main__":
    spark = session("table5-imdb")
    run = tables.imdb_experiment(
        spark, n_film_pages=40, n_person_pages=24, n_episode_pages=12
    )
    for name, fn in (
        ("Table 2 (seed KB)", tables.table2),
        ("Table 5 (extraction quality)", tables.table5),
        ("Table 6 (annotation accuracy)", tables.table6),
        ("Table 7 (topic identification)", tables.table7),
    ):
        print(f"== {name} ==")
        print(fn(run).to_string(index=False))
