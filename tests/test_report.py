"""Report formatting: markdown tables with paper-vs-measured columns."""
from repro.analysis.harness import RunRecord
from repro.analysis.report import (
    dataset_stats,
    format_rounds_table,
    format_table2,
    format_table3,
    format_table4,
    format_table5,
)
from repro.graphs.datasets import dataset_names


def _rec(ds, algo, aborted=False, seconds=1.5):
    return RunRecord(
        algo, ds, "test", 0, seconds, 7, 20, 1000, 16000, 5000, 80000,
        3000, 48000, 900, 12, aborted, "space budget" if aborted else None,
    ).to_dict()


def _full_grid():
    recs = []
    for ds in dataset_names():
        for a in ("rc", "hm", "tp", "cr"):
            recs.append(_rec(ds, a, aborted=(a == "hm" and ds == "path100m")))
    return recs


class TestTable2:
    def test_contains_all_datasets(self):
        stats = dataset_stats(profile="test")
        md = format_table2(stats)
        for name in dataset_names():
            assert name in md
        assert "paper" in md

    def test_counts_positive(self):
        for s in dataset_stats(profile="test"):
            assert s["vertices"] > 0 and s["edges"] > 0 and s["components"] > 0


class TestGridTables:
    def test_table3_rows_and_dash(self):
        md = format_table3(_full_grid())
        assert md.count("\n") == len(dataset_names()) + 1
        assert "—" in md  # both our abort and the paper's missing entries
        assert "1.5" in md

    def test_table4_mb_and_paper_gb(self):
        md = format_table4(_full_grid())
        assert "input ours (MB)" in md and "paper (GB)" in md
        assert "0.0" in md or "MB" in md

    def test_table5(self):
        md = format_table5(_full_grid())
        assert "RC ours (MB)" in md
        for name in dataset_names():
            assert name in md

    def test_missing_cells_marked(self):
        md = format_table3([_rec("rmat", "rc")])
        assert "?" in md  # cells never run

    def test_rounds_table(self):
        md = format_rounds_table(_full_grid())
        assert "| rmat |" in md and "7" in md and "—" in md
