"""Graph generators: shapes, determinism, ID domains, structural properties."""
import numpy as np
import pandas as pd
import pytest

from repro.analysis.union_find import components_pandas, n_components
from repro.graphs import generators as G


def _vertices(pdf):
    return set(pdf["v"].tolist()) | set(pdf["w"].tolist())


class TestPath:
    def test_sequential(self):
        pdf = G.path(5)
        assert list(pdf["v"]) == [0, 1, 2, 3] and list(pdf["w"]) == [1, 2, 3, 4]

    def test_single_vertex_is_loop(self):
        pdf = G.path(1)
        assert len(pdf) == 1 and pdf["v"][0] == pdf["w"][0]

    def test_random_numbering_same_structure(self):
        pdf = G.path(50, numbering="random", seed=1)
        assert len(pdf) == 49
        assert n_components(pdf) == 1
        deg = pd.concat([pdf["v"], pdf["w"]]).value_counts()
        assert (deg <= 2).all()

    def test_optimal_numbering_valid(self):
        pdf = G.path(30, numbering="optimal")
        assert n_components(pdf) == 1
        assert len(_vertices(pdf)) == 30

    def test_bad_numbering_raises(self):
        with pytest.raises(ValueError):
            G.path(5, numbering="nope")
        with pytest.raises(ValueError):
            G.path(0)


class TestPathUnion:
    def test_component_count(self):
        pdf = G.path_union([4, 7, 11])
        assert n_components(pdf) == 3

    def test_total_sizing(self):
        pdf = G.path_union(total=1000, n_paths=10)
        assert n_components(pdf) == 10
        assert 900 <= len(_vertices(pdf)) <= 2100

    def test_zigzag_ids_are_block_local(self):
        pdf = G.path_union([6, 6], numbering="zigzag")
        vs = _vertices(pdf)
        assert vs == set(range(12))

    def test_requires_lengths_or_total(self):
        with pytest.raises(ValueError):
            G.path_union()

    def test_numbering_variants(self):
        for nb in ["zigzag", "sequential", "random"]:
            pdf = G.path_union([5, 8], numbering=nb)
            assert n_components(pdf) == 2


class TestRmat:
    def test_shape_and_domain(self):
        pdf = G.rmat(8, 1000, seed=0)
        assert len(pdf) == 1000
        assert pdf["v"].min() >= 0

    def test_unrandomised_ids_below_2_pow_scale(self):
        pdf = G.rmat(8, 1000, seed=0, randomize=False)
        assert pdf[["v", "w"]].to_numpy().max() < 2**8

    def test_skewed_degrees(self):
        pdf = G.rmat(10, 20000, seed=1, randomize=False)
        deg = pd.concat([pdf["v"], pdf["w"]]).value_counts()
        # R-MAT(0.57,...) concentrates mass: top vertex ≫ median
        assert deg.iloc[0] > 10 * deg.median()

    def test_probabilities_must_sum_to_one(self):
        with pytest.raises(ValueError):
            G.rmat(5, 10, a=0.5, b=0.5, c=0.5, d=0.5)

    def test_deterministic(self):
        a = G.rmat(8, 500, seed=3)
        b = G.rmat(8, 500, seed=3)
        pd.testing.assert_frame_equal(a, b)


class TestImageVideo:
    def test_image_graph_degree_bound(self):
        pdf = G.image_graph(24, 16, seed=0)
        deg = pd.concat([pdf["v"], pdf["w"]]).value_counts()
        assert deg.max() <= 4  # 2-D 4-connectivity

    def test_video_graph_degree_bound(self):
        pdf = G.video_graph(8, 6, 5, seed=0)
        deg = pd.concat([pdf["v"], pdf["w"]]).value_counts()
        assert deg.max() <= 6  # 3-D 6-connectivity

    def test_video_larger_with_more_frames(self):
        e1 = len(G.video_graph(8, 6, 4, seed=0))
        e2 = len(G.video_graph(8, 6, 8, seed=0))
        assert e2 > 1.5 * e1

    def test_ids_randomised(self):
        pdf = G.image_graph(24, 16, seed=0)
        # randomised IDs: edge endpoints are not mostly adjacent integers
        frac_adjacent = float(np.mean(np.abs(pdf["v"] - pdf["w"]) <= 24))
        assert frac_adjacent < 0.5

    def test_threshold_monotone(self):
        tight = G.image_graph(24, 16, threshold=10, seed=0)
        loose = G.image_graph(24, 16, threshold=200, seed=0)
        assert len(tight) < len(loose)


class TestSocialAndBitcoin:
    def test_chung_lu_power_law(self):
        pdf = G.chung_lu(300, 4000, seed=0)
        deg = pd.concat([pdf["v"], pdf["w"]]).value_counts()
        assert deg.iloc[0] > 5 * deg.median()

    def test_chung_lu_no_loops(self):
        pdf = G.chung_lu(100, 1000, seed=1)
        assert (pdf["v"] != pdf["w"]).all()

    def test_bitcoin_addresses_bipartite(self):
        pdf = G.bitcoin_addresses(500, seed=0)
        # before ID randomisation the graph is bipartite by construction;
        # after it, we can still check no tx-tx or addr-addr edge exists by
        # regenerating the structure deterministically
        assert len(pdf) >= 500
        assert n_components(pdf) > 0.1 * len(_vertices(pdf))

    def test_bitcoin_full_few_components(self):
        pdf = G.bitcoin_full(2000, seed=0)
        assert n_components(pdf) < 0.05 * len(_vertices(pdf))


class TestStreets:
    def test_connected_single_component(self):
        pdf = G.streets(15, 15, seed=0)
        assert n_components(pdf) == 1

    def test_edge_count_near_vertices(self):
        pdf = G.streets(20, 20, seed=0)
        nv = len(_vertices(pdf))
        assert nv == 400
        assert 399 <= len(pdf) <= 1.1 * nv


class TestCommon:
    def test_all_ids_fit_gfp_domain(self):
        from repro.ff import gfp

        for pdf in [
            G.image_graph(16, 12, seed=0),
            G.rmat(8, 500, seed=0),
            G.chung_lu(100, 500, seed=0),
            G.bitcoin_addresses(200, seed=0),
            G.streets(8, 8, seed=0),
        ]:
            arr = pdf[["v", "w"]].to_numpy()
            assert arr.min() >= 0 and arr.max() < gfp.P

    def test_randomise_ids_preserves_structure(self):
        pdf = G.path(40)
        r = G.randomise_ids(pdf, seed=9)
        assert n_components(r) == 1
        assert len(_vertices(r)) == 40
        assert not r.equals(pdf)

    def test_to_spark_schema(self, spark):
        df = G.to_spark(spark, G.path(5))
        assert [f.dataType.simpleString() for f in df.schema.fields] == ["bigint", "bigint"]

    def test_random_edges_deterministic(self):
        a = G.random_edges(10, 20, seed=4)
        b = G.random_edges(10, 20, seed=4)
        pd.testing.assert_frame_equal(a, b)
