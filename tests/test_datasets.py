"""Dataset registry: profiles, paper metadata, reproducibility."""
import pytest

from repro.analysis.union_find import n_components
from repro.graphs.datasets import STREETS, dataset_names, get_dataset


class TestRegistry:
    def test_twelve_datasets_in_table_order(self):
        names = dataset_names()
        assert len(names) == 12
        assert names[0] == "andromeda" and names[-1] == "pathunion10"

    def test_get_unknown_raises(self):
        with pytest.raises(ValueError):
            get_dataset("nope")

    def test_streets_accessible(self):
        assert get_dataset("streets_italy") is STREETS

    @pytest.mark.parametrize("name", dataset_names())
    def test_paper_numbers_present(self, name):
        p = get_dataset(name).paper
        assert p.vertices_m > 0 and p.edges_m > 0
        assert set(p.runtime_s) == {"rc", "hm", "tp", "cr"}
        assert p.runtime_s["rc"] is not None  # RC finished everywhere

    def test_paper_rc_always_fastest(self):
        """Table III's headline: RC wins on every dataset."""
        for name in dataset_names():
            rt = get_dataset(name).paper.runtime_s
            rc = rt["rc"]
            for algo in ("hm", "tp", "cr"):
                if rt[algo] is not None:
                    assert rc < rt[algo], name


@pytest.mark.parametrize("name", dataset_names())
def test_test_profile_builds_small(name, spark):
    spec = get_dataset(name)
    pdf = spec.build_pandas("test", seed=0)
    assert 1 <= len(pdf) <= 30_000
    df = spec.build(spark, "test", seed=0)
    assert df.columns == ["v", "w"]


class TestDeterminism:
    @pytest.mark.parametrize("name", ["andromeda", "rmat", "friendster"])
    def test_same_seed_same_graph(self, name):
        spec = get_dataset(name)
        a = spec.build_pandas("test", seed=3)
        b = spec.build_pandas("test", seed=3)
        assert a.equals(b)

    def test_different_seed_different_graph(self):
        spec = get_dataset("rmat")
        a = spec.build_pandas("test", seed=1)
        b = spec.build_pandas("test", seed=2)
        assert not a.equals(b)


class TestStructuralShape:
    def test_path100m_sequential_numbering(self):
        pdf = get_dataset("path100m").build_pandas("test", seed=0)
        assert list(pdf["v"]) == list(range(len(pdf)))

    def test_pathunion_has_ten_components(self):
        pdf = get_dataset("pathunion10").build_pandas("test", seed=0)
        assert n_components(pdf) == 10

    def test_friendster_single_giant_component(self):
        pdf = get_dataset("friendster").build_pandas("test", seed=0)
        assert n_components(pdf) <= 3

    def test_bitcoin_addresses_many_components(self):
        pdf = get_dataset("bitcoin_addresses").build_pandas("test", seed=0)
        from repro.analysis.union_find import components_pandas

        lab = components_pandas(pdf)
        frac = lab["c"].nunique() / lab["v"].nunique()
        assert 0.1 <= frac <= 0.45  # paper: ≈25% of vertices are components

    def test_candels_series_doubles(self):
        sizes = [
            len(get_dataset(f"candels{f}").build_pandas("bench", seed=0))
            for f in (10, 20, 40)
        ]
        assert 1.7 <= sizes[1] / sizes[0] <= 2.3
        assert 1.7 <= sizes[2] / sizes[1] <= 2.3
