"""Micro-scale smoke tests of the table harnesses (full-scale runs live
in benchmarks/)."""
import pytest

from repro.experiments.paper_numbers import (
    PAPER_TABLE1,
    PAPER_TABLE2,
    PAPER_TABLE3,
    PAPER_TABLE4,
    PAPER_TABLE5,
)
from repro.experiments.tables import format_table, table1


class TestPaperNumbers:
    def test_table2_paper_shape(self):
        """Sanity: the transcribed paper numbers themselves show the
        LR-beats-S-V shape our benchmarks assert."""
        for ds, row in PAPER_TABLE2.items():
            assert row["lr"][0] < row["sv"][0]
            assert row["lr"][1] < row["sv"][1]
            assert row["lr"][2] < row["sv"][2]
        for ds, row in PAPER_TABLE3.items():
            assert row["lr"][0] < row["sv"][0]
            assert row["lr"][1] < row["sv"][1]

    def test_table4_paper_shape(self):
        t = PAPER_TABLE4
        assert t["n50"]["PPA"] == max(t["n50"].values())
        assert t["genome_fraction_pct"]["PPA"] == max(t["genome_fraction_pct"].values())
        assert t["n_misassemblies"]["SWAP"] == max(t["n_misassemblies"].values())
        assert t["mismatches_per_100kbp"]["SWAP"] == max(
            t["mismatches_per_100kbp"].values()
        )

    def test_table5_paper_shape(self):
        t = PAPER_TABLE5
        assert t["n50"]["PPA"] == max(t["n50"].values())
        assert t["largest_contig"]["PPA"] == max(t["largest_contig"].values())

    def test_table1_transcription(self):
        assert PAPER_TABLE1["hc2"]["ref_len"] == 48_170_570
        assert PAPER_TABLE1["bi"]["n_reads"] == 151_550_000


class TestHarness:
    def test_table1_micro(self, spark):
        rows = table1(spark, scale=0.02)
        assert [r["dataset"] for r in rows] == ["hc2", "hcx", "hc14", "bi"]
        for r in rows:
            assert r["n_reads"] > 0 and r["ref_len"] > 0
            # depth is preserved under scaling (±30% at micro scale)
            from repro.genome.simulate import DATASETS

            assert r["depth_x"] == pytest.approx(
                DATASETS[r["dataset"]].depth(), rel=0.3
            )

    def test_format_table(self):
        rows = [{"a": 1, "b": "xy"}, {"a": 22, "b": "z"}]
        out = format_table(rows, "T")
        lines = out.splitlines()
        assert lines[0] == "### T"
        assert "| a " in lines[1] and "| 22 |" in lines[4]

    def test_format_table_empty(self):
        assert "(no rows)" in format_table([], "T")
