"""Tests for repro.experiments.table2 — profiling harness (small scale)."""
import pytest

from repro.experiments.table2 import PAPER_TABLE2, PAPER_VS, run_table2


@pytest.fixture(scope="module")
def table2(spark):
    return run_table2(spark, scale=0.1)


class TestTable2:
    def test_four_splits(self, table2):
        assert list(table2["split"]) == ["X2", "Z2", "X3", "Z3"]

    def test_paper_columns_attached(self, table2):
        for c in ("paper_SP", "paper_TX", "paper_TC", "paper_PR", "paper_VS"):
            assert c in table2.columns

    def test_sparsity_shape(self, table2):
        t = table2.set_index("split")
        assert t.loc["X3", "SP"] > t.loc["X2", "SP"] + 0.2
        assert t.loc["Z3", "SP"] > t.loc["Z2", "SP"] + 0.1

    def test_textuality_shape(self, table2):
        t = table2.set_index("split")
        assert t.loc["X2", "TX"] > t.loc["X3", "TX"]
        assert t.loc["Z2", "TX"] > t.loc["Z3", "TX"]

    def test_positive_ratio_near_paper(self, table2):
        t = table2.set_index("split")
        for split in ("X2", "Z2", "X3", "Z3"):
            assert t.loc[split, "PR"] == pytest.approx(
                PAPER_TABLE2[split.lower()]["PR"], rel=0.25
            )

    def test_vs_ordering(self, table2):
        t = table2.set_index("split")
        assert t.loc["X2", "VS"] > t.loc["X3", "VS"]

    def test_paper_constants_sane(self):
        assert PAPER_VS == {"D2": 0.590, "D3": 0.377}
        assert PAPER_TABLE2["x2"]["TC"] == 58_653
