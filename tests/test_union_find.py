"""Union–find oracle: hand-checked graphs and self-consistency."""
import numpy as np
import pandas as pd
import pytest

from repro.analysis.union_find import (
    UnionFind,
    assert_valid_labels,
    components_pandas,
    n_components,
    normalise_labels,
)


class TestUnionFind:
    def test_basic(self):
        uf = UnionFind(5)
        uf.union(0, 1)
        uf.union(3, 4)
        assert uf.find(0) == uf.find(1)
        assert uf.find(3) == uf.find(4)
        assert uf.find(0) != uf.find(3)
        assert uf.find(2) == 2

    def test_chain(self):
        uf = UnionFind(100)
        for i in range(99):
            uf.union(i, i + 1)
        assert len({uf.find(i) for i in range(100)}) == 1


class TestComponents:
    def test_two_components(self):
        e = pd.DataFrame({"v": [1, 2, 10], "w": [2, 3, 11]})
        lab = components_pandas(e)
        assert dict(zip(lab["v"], lab["c"])) == {1: 1, 2: 1, 3: 1, 10: 10, 11: 10}

    def test_loop_edge_isolated_vertex(self):
        e = pd.DataFrame({"v": [5, 1], "w": [5, 2]})
        lab = components_pandas(e)
        assert dict(zip(lab["v"], lab["c"])) == {1: 1, 2: 1, 5: 5}

    def test_n_components(self):
        e = pd.DataFrame({"v": [0, 2, 4, 6], "w": [1, 3, 5, 6]})
        assert n_components(e) == 4

    def test_noncontiguous_ids(self):
        e = pd.DataFrame({"v": [2**30, 7], "w": [7, 2**20]})
        lab = components_pandas(e)
        assert lab["c"].nunique() == 1
        assert lab["c"].iloc[0] == 7

    def test_random_graph_component_count_matches_bfs(self):
        rng = np.random.default_rng(0)
        e = pd.DataFrame(
            {"v": rng.integers(0, 50, 60), "w": rng.integers(0, 50, 60)}
        )
        # reference BFS over adjacency dict
        adj: dict[int, set[int]] = {}
        for v, w in zip(e["v"], e["w"]):
            adj.setdefault(int(v), set()).add(int(w))
            adj.setdefault(int(w), set()).add(int(v))
        seen, comps = set(), 0
        for s in adj:
            if s in seen:
                continue
            comps += 1
            stack = [s]
            while stack:
                u = stack.pop()
                if u in seen:
                    continue
                seen.add(u)
                stack.extend(adj[u] - seen)
        assert n_components(e) == comps


class TestLabelValidation:
    def test_normalise(self):
        res = pd.DataFrame({"v": [1, 2, 3], "r": [99, 99, 7]})
        norm = normalise_labels(res)
        assert dict(zip(norm["v"], norm["c"])) == {1: 1, 2: 1, 3: 3}

    def test_accepts_correct_labels(self):
        e = pd.DataFrame({"v": [1, 3], "w": [2, 4]})
        good = pd.DataFrame({"v": [1, 2, 3, 4], "r": [10, 10, 20, 20]})
        assert_valid_labels(good, e)

    def test_rejects_merged_components(self):
        e = pd.DataFrame({"v": [1, 3], "w": [2, 4]})
        bad = pd.DataFrame({"v": [1, 2, 3, 4], "r": [10, 10, 10, 10]})
        with pytest.raises(AssertionError):
            assert_valid_labels(bad, e)

    def test_rejects_split_components(self):
        e = pd.DataFrame({"v": [1, 2], "w": [2, 3]})
        bad = pd.DataFrame({"v": [1, 2, 3], "r": [1, 1, 3]})
        with pytest.raises(AssertionError):
            assert_valid_labels(bad, e)

    def test_rejects_missing_vertex(self):
        e = pd.DataFrame({"v": [1], "w": [2]})
        bad = pd.DataFrame({"v": [1], "r": [1]})
        with pytest.raises(AssertionError):
            assert_valid_labels(bad, e)

    def test_rejects_duplicate_vertex(self):
        e = pd.DataFrame({"v": [1], "w": [2]})
        bad = pd.DataFrame({"v": [1, 2, 2], "r": [1, 1, 1]})
        with pytest.raises(AssertionError):
            assert_valid_labels(bad, e)
