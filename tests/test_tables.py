"""Table harnesses produce well-formed rows with paper columns."""
import pandas as pd
import pytest

from repro.eval import paper, tables


class TestTable1:
    def test_rows(self, swde_runs):
        t = tables.table1(swde_runs)
        assert set(t["vertical"]) == set(swde_runs)
        assert (t["n_pages"] > 0).all()
        assert (t["paper_n_pages"] > 0).all()


class TestTable3:
    @pytest.fixture(scope="class")
    def t3(self, swde_runs):
        return tables.table3(swde_runs)

    def test_paper_rows_present(self, t3):
        assert set(paper.TABLE3) <= set(t3["system"])

    def test_our_systems_present(self, t3):
        ours = t3[t3["source"] == "ours"]
        assert set(ours["system"]) == {
            "Vertex++", "CERES-Baseline", "CERES-Topic", "CERES-Full",
        }

    def test_f1_in_range(self, t3, swde_runs):
        ours = t3[t3["source"] == "ours"]
        for v in swde_runs:
            vals = ours[v].dropna()
            assert ((vals >= 0) & (vals <= 1)).all()

    def test_ceres_full_competitive_on_nba(self, t3):
        ours = t3[t3["source"] == "ours"].set_index("system")
        assert ours.loc["CERES-Full", "nbaplayer"] > 0.8

    def test_full_beats_or_matches_baseline(self, t3, swde_runs):
        ours = t3[t3["source"] == "ours"].set_index("system")
        for v in swde_runs:
            base = ours.loc["CERES-Baseline", v]
            full = ours.loc["CERES-Full", v]
            if pd.notna(base) and pd.notna(full):
                assert full >= base - 0.05


class TestTable4:
    def test_official_predicates_only(self, swde_runs):
        t4 = tables.table4(swde_runs)
        from repro.webgen.corpora import SWDE_PREDICATES

        for v in swde_runs:
            preds = set(t4[t4["vertical"] == v]["predicate"])
            assert preds == set(SWDE_PREDICATES[v])

    def test_paper_columns_present(self, swde_runs):
        t4 = tables.table4(swde_runs)
        assert {"paper_vertex_f1", "paper_full_f1"} <= set(t4.columns)


class TestImdbTables:
    def test_table2(self, imdb_run):
        t = tables.table2(imdb_run)
        assert set(t["entity_type"]) == {"person", "film", "tv_series", "tv_episode"}
        assert (t["instances"] > 0).all()

    def test_table5_shapes(self, imdb_run):
        t5 = tables.table5(imdb_run)
        assert set(t5["domain"]) <= {"Person", "Film/TV"}
        assert "ALL" in set(t5["predicate"])
        for col in ("topic_f1", "full_f1"):
            assert ((t5[col] >= 0) & (t5[col] <= 1)).all()

    def test_table5_full_beats_topic_overall(self, imdb_run):
        t5 = tables.table5(imdb_run)
        alls = t5[t5["predicate"] == "ALL"].set_index("domain")
        # The paper's headline: Algorithm 2 annotations beat Topic-only.
        # At test scale we require it on the larger Film/TV domain; the
        # Person domain (a handful of train pages) is checked only for
        # "not wildly worse" — the bench run shows the full gap.
        assert alls.loc["Film/TV", "full_p"] >= alls.loc["Film/TV", "topic_p"] - 0.05
        if alls.loc["Person", "full_p"] > 0:
            assert alls.loc["Person", "full_p"] >= alls.loc["Person", "topic_p"] - 0.3

    def test_table6_shapes(self, imdb_run):
        t6 = tables.table6(imdb_run)
        assert "ALL" in set(t6["predicate"])
        assert ((t6["full_p"] >= 0) & (t6["full_p"] <= 1)).all()

    def test_table6_full_annotation_precision_higher(self, imdb_run):
        t6 = tables.table6(imdb_run)
        alls = t6[t6["predicate"] == "ALL"]
        assert (alls["full_p"] >= alls["topic_p"] - 0.05).all()

    def test_table7_high_precision(self, imdb_run):
        t7 = tables.table7(imdb_run)
        assert len(t7) >= 1
        assert (t7["precision"] > 0.8).all()


class TestCommonCrawlTables:
    def test_table8_per_site_rows(self, cc_run):
        t8 = tables.table8(cc_run)
        sites = {s.spec.name for s in cc_run.corpus.sites}
        assert sites <= set(t8["site"])
        assert "TOTAL" in set(t8["site"])

    def test_table8_chart_only_site_extracts_nothing(self, cc_run):
        t8 = tables.table8(cc_run).set_index("site")
        assert t8.loc["boxofficemojo.example", "n_extractions"] == 0

    def test_table8_extraction_exceeds_annotation_on_clean_site(self, cc_run):
        t8 = tables.table8(cc_run).set_index("site")
        assert (
            t8.loc["themoviedb.example", "n_extractions"]
            >= t8.loc["themoviedb.example", "n_annotations"]
        )

    def test_table8_quirky_sites_lower_precision(self, cc_run):
        t8 = tables.table8(cc_run).set_index("site")
        clean = t8.loc["themoviedb.example", "precision"]
        noisy = t8.loc["laborfilms.example", "precision"]
        if pd.notna(clean) and pd.notna(noisy):
            assert noisy <= clean

    def test_table9_rows(self, cc_run):
        t9 = tables.table9(cc_run)
        assert len(t9) >= 3
        assert (t9["n_extractions"] > 0).all()
        assert {"paper_precision", "paper_extractions"} <= set(t9.columns)


class TestPaperConstants:
    def test_table3_has_12_systems(self):
        assert len(paper.TABLE3) == 12

    def test_table8_total_precision(self):
        assert paper.TABLE8_TOTALS["precision"] == 0.83

    def test_table9_has_10_predicates(self):
        assert len(paper.TABLE9) == 10

    def test_table5_domains(self):
        assert {d for d, _ in paper.TABLE5} == {"Person", "Film/TV"}

    def test_table4_movie_ceres_missing_mpaa(self):
        assert paper.TABLE4[("movie", "mpaa_rating")][3] is None
