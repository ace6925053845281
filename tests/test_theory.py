"""The paper's theory claims, by enumeration/simulation (§IV–VI, App. B)."""
import random

import pytest

from repro.core import theory
from repro.ff import get_method


def _path_edges(n):
    return [(i, i + 1) for i in range(n - 1)]


class TestFig2PathCases:
    def test_sequential_path_is_worst_case(self):
        """Fig 2(a): identity labelling contracts a path by exactly one vertex."""
        n = 50
        new_edges, r = theory.contract_once(_path_edges(n), lambda v: v)
        survivors = set(r.values())
        assert len(survivors) == n - 1

    def test_optimal_path_contracts_to_a_third(self):
        """Fig 2(b): the optimal labelling contracts to ~n/3 vertices."""
        from repro.graphs import generators as G

        n = 30
        pdf = G.path(n, numbering="optimal")
        edges = list(zip(pdf["v"].tolist(), pdf["w"].tolist()))
        _, r = theory.contract_once(edges, lambda v: v)
        assert len(set(r.values())) <= (n + 2) // 3 + 1

    def test_contraction_preserves_components(self):
        edges = [(0, 1), (1, 2), (5, 6), (6, 7), (7, 5)]
        new_edges, r = theory.contract_once(edges, lambda v: -v)
        # two components before → at most two non-trivial groups after
        left = {r[0], r[1], r[2]}
        right = {r[5], r[6], r[7]}
        assert left.isdisjoint(right)


class TestTheorem1:
    """E(#representatives) ≤ 3/4·|V| under the finite-fields method."""

    @pytest.mark.parametrize("graph", ["path", "cycle", "star", "clique"])
    def test_expected_shrinkage(self, graph):
        n = 24
        if graph == "path":
            edges = _path_edges(n)
        elif graph == "cycle":
            edges = _path_edges(n) + [(n - 1, 0)]
        elif graph == "star":
            edges = [(0, i) for i in range(1, n)]
        else:
            edges = [(i, j) for i in range(n) for j in range(i + 1, n)]
        m = get_method("gfp")
        rng = random.Random(0)
        total = 0
        trials = 400
        for _ in range(trials):
            params = m.draw(rng)
            r = theory.representatives(edges, lambda v: m.h_scalar(params, v))
            total += len(set(r.values()))
        mean = total / trials
        # 3/4 bound plus generous sampling slack.
        assert mean <= 0.75 * n + 0.05 * n, f"{graph}: mean reps {mean:.2f}"


class TestTheorem2FullRandomisation:
    """Appendix B: E(#reps) ≤ (2/3)n, tight on the directed 3-cycle."""

    def test_directed_3cycle_is_tight(self):
        edges = [(0, 1), (1, 2), (2, 0)]
        e = theory.expected_representatives(edges, directed=True)
        assert e == pytest.approx(2.0)  # (2/3) * 3

    @pytest.mark.parametrize(
        "edges",
        [
            _path_edges(4),
            _path_edges(6),
            [(0, 1), (1, 2), (2, 0)],  # triangle (undirected)
            [(0, i) for i in range(1, 6)],  # star
            [(i, j) for i in range(5) for j in range(i + 1, 5)],  # K5
            [(0, 1), (1, 2), (2, 3), (3, 0)],  # C4
            [(0, 1), (1, 2), (3, 4)],  # disconnected
        ],
    )
    def test_undirected_bound(self, edges):
        n = len({v for e in edges for v in e})
        e = theory.expected_representatives(edges)
        assert e <= (2 / 3) * n + 1e-9

    def test_directed_bound(self):
        # every vertex needs a nonempty out-neighbourhood
        edges = [(0, 1), (1, 2), (2, 3), (3, 0), (1, 3)]
        n = 4
        e = theory.expected_representatives(edges, directed=True)
        assert e <= (2 / 3) * n + 1e-9

    def test_enumeration_guard(self):
        with pytest.raises(ValueError):
            theory.expected_representatives(_path_edges(12))


class TestGeometricConvergence:
    def test_rc_rounds_logarithmic_on_paths(self):
        """Repeated randomised contraction empties a path in O(log n) steps."""
        m = get_method("gfp")
        rng = random.Random(1)
        for n in [32, 128, 512]:
            edges = set(map(tuple, _path_edges(n)))
            rounds = 0
            while edges:
                params = m.draw(rng)
                edges, _ = theory.contract_once(edges, lambda v: m.h_scalar(params, v))
                rounds += 1
                assert rounds < 80
            # γ ≤ 3/4 ⇒ ~log_{4/3} n rounds; allow wide slack.
            import math

            assert rounds <= 6 * math.log2(n)
