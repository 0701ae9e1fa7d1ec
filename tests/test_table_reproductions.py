"""Tests that the table builders emit the paper's structures
(Tables I, II, III; Table IV is covered by test_experiments)."""
import pytest

from repro.experiments.tables import table1_layout, table2_datasets, table3_queries


class TestTable1:
    def test_three_partitions(self):
        df = table1_layout()
        assert len(df) == 3

    def test_signatures(self):
        df = table1_layout()
        assert set(df["signature"]) == {"{A,C}", "{A,A,B}", "{A,B,C,C}"}

    def test_partition_contents(self):
        df = table1_layout().set_index("signature")
        es = df.loc["{A,C}", "hyperedges"]
        assert any(e.startswith("e1=") for e in es)
        assert any(e.startswith("e2=") for e in es)

    def test_inverted_index_posting_example(self):
        # Example IV.2 analogue: v4's posting list in {A,B,C,C} is
        # [e5, e6], ascending.
        df = table1_layout().set_index("signature")
        inv = df.loc["{A,B,C,C}", "inverted_index"]
        assert inv["v4"] == ["e5", "e6"]


class TestTable2:
    @pytest.fixture(scope="class")
    def tab(self):
        return table2_datasets(scale=0.15, seed=2)

    def test_ten_rows_in_paper_order(self, tab):
        assert list(tab.index) == [
            "HC", "MA", "CH", "CP", "SB", "HB", "WT", "TC", "SA", "AR"
        ]

    def test_measured_and_paper_columns(self, tab):
        for col in ("|V|", "|E|", "a_max", "avg_a", "index",
                    "paper_|V|", "paper_|E|", "paper_avg_a", "paper_index"):
            assert col in tab.columns

    def test_high_arity_datasets_stay_high_arity(self, tab):
        assert tab.loc["HC", "avg_a"] > tab.loc["CH", "avg_a"]
        assert tab.loc["HB", "avg_a"] > tab.loc["CP", "avg_a"]

    def test_paper_reference_numbers(self, tab):
        assert tab.loc["AR", "paper_|E|"] == 4_239_108
        assert tab.loc["HC", "paper_avg_a"] == 34.8


class TestTable3:
    @pytest.fixture(scope="class")
    def tab(self):
        return table3_queries(dataset="WT", n_queries=3, scale=0.3, seed=1)

    def test_four_settings(self, tab):
        assert list(tab.index) == ["q2", "q3", "q4", "q6"]

    def test_paper_parameters(self, tab):
        assert tab.loc["q2", "|E|"] == 2 and tab.loc["q2", "|V|_max"] == 15
        assert tab.loc["q6", "|E|"] == 6 and tab.loc["q6", "|V|_min"] == 15

    def test_sampled_queries_connected(self, tab):
        assert tab["all_connected"].all()

    def test_sampled_counts(self, tab):
        assert (tab["sampled"] == 3).all()
