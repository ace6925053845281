"""Table II — dataset generation + measured |V|, |E|, #components.

One benchmark per dataset (generation + union-find counting, pure Python);
the counts are written to results/table2.json for EXPERIMENTS.md.
"""
import json

import pytest

from repro.analysis.union_find import components_pandas
from repro.graphs.datasets import dataset_names, get_dataset

from benchmarks.helpers import RESULTS_DIR, run_once

_TABLE2 = RESULTS_DIR / "table2.json"


def _save(entry: dict) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    rows = {}
    if _TABLE2.exists():
        rows = {r["dataset"]: r for r in json.loads(_TABLE2.read_text())}
    rows[entry["dataset"]] = entry
    _TABLE2.write_text(json.dumps(sorted(rows.values(), key=lambda r: r["dataset"]), indent=1))


@pytest.mark.parametrize("dataset", dataset_names())
def test_dataset_stats(benchmark, dataset):
    spec = get_dataset(dataset)

    def build_and_count():
        pdf = spec.build_pandas("bench", seed=0)
        lab = components_pandas(pdf)
        return {
            "dataset": dataset,
            "vertices": int(lab["v"].nunique()),
            "edges": int(len(pdf)),
            "components": int(lab["c"].nunique()),
        }

    stats = run_once(benchmark, build_and_count)
    _save(stats)
    p = spec.paper
    # Shape assertions vs Table II: the |E|/|V| ratio within 2× of the paper.
    ratio_ours = stats["edges"] / stats["vertices"]
    ratio_paper = p.edges_m / p.vertices_m
    assert 0.5 <= ratio_ours / ratio_paper <= 2.0, (dataset, ratio_ours, ratio_paper)
