"""Tests for Algorithm 1 (minimal covering sub-DAG) and MCS components."""
import random

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.dag import DAG
from repro.core.mcs import brute_force_mcs, components, find_mcs, head_operators


def fig5_dag() -> DAG:
    return DAG.from_edges(
        [("A", "C"), ("B", "G"), ("C", "D"), ("C", "E"), ("D", "F"), ("E", "F"),
         ("F", "H"), ("G", "H")]
    )


class TestAlgorithm1:
    def test_paper_fig7_example(self):
        """Figure 7: MCS of {C, F, G} = {C,D,E,F,G} with the diamond edges."""
        mcs = find_mcs(fig5_dag(), {"C", "F", "G"})
        assert set(mcs.vertices) == {"C", "D", "E", "F", "G"}
        assert set(mcs.edges) == {("C", "D"), ("C", "E"), ("D", "F"), ("E", "F")}

    def test_single_vertex(self):
        mcs = find_mcs(fig5_dag(), {"D"})
        assert set(mcs.vertices) == {"D"}
        assert not mcs.edges

    def test_two_connected(self):
        mcs = find_mcs(fig5_dag(), {"A", "F"})
        assert set(mcs.vertices) == {"A", "C", "D", "E", "F"}

    def test_disconnected_pair(self):
        mcs = find_mcs(fig5_dag(), {"D", "G"})
        assert set(mcs.vertices) == {"D", "G"}
        assert not mcs.edges

    def test_unknown_operator_raises(self):
        import pytest

        with pytest.raises(KeyError):
            find_mcs(fig5_dag(), {"nope"})

    def test_full_set(self):
        d = fig5_dag()
        mcs = find_mcs(d, set(d.vertices))
        assert set(mcs.vertices) == set(d.vertices)
        assert set(mcs.edges) == set(d.edges)

    def test_chain_interior_included(self):
        d = DAG.from_edges([("a", "b"), ("b", "c"), ("c", "d")])
        mcs = find_mcs(d, {"a", "d"})
        assert set(mcs.vertices) == {"a", "b", "c", "d"}

    def test_vertex_not_on_a_path_excluded(self):
        # a->b->c, a->x (x not between any pair of {a, c})
        d = DAG.from_edges([("a", "b"), ("b", "c"), ("a", "x")])
        mcs = find_mcs(d, {"a", "c"})
        assert "x" not in mcs.vertices

    def test_matches_brute_force_on_paper_graph(self):
        d = fig5_dag()
        for m in ({"C", "F"}, {"A", "H"}, {"B", "F"}, {"C", "F", "G"}, {"D", "E"}):
            fast = find_mcs(d, m)
            slow = brute_force_mcs(d, m)
            assert fast.vertices == slow.vertices
            assert fast.edges == slow.edges


def _random_dag(seed: int, n: int, p: float) -> DAG:
    rng = random.Random(seed)
    names = [f"v{i}" for i in range(n)]
    edges = [
        (names[i], names[j])
        for i in range(n)
        for j in range(i + 1, n)
        if rng.random() < p
    ]
    d = DAG()
    for v in names:
        d.add_operator(v)
    for a, b in edges:
        d.add_edge(a, b)
    return d


@settings(max_examples=60, deadline=None)
@given(seed=st.integers(0, 10_000), n=st.integers(2, 8), p=st.floats(0.1, 0.7),
       k=st.integers(1, 4))
def test_mcs_matches_brute_force_random(seed, n, p, k):
    """Lemma 5.5 + Algorithm 1 correctness: the O(V+E) marking algorithm
    equals the literal Def-5.4 construction on random DAGs."""
    d = _random_dag(seed, n, p)
    rng = random.Random(seed + 1)
    m = set(rng.sample(d.vertices, min(k, len(d.vertices))))
    fast = find_mcs(d, m)
    slow = brute_force_mcs(d, m)
    assert fast.vertices == slow.vertices
    assert fast.edges == slow.edges


@settings(max_examples=40, deadline=None)
@given(seed=st.integers(0, 10_000), n=st.integers(2, 8), p=st.floats(0.1, 0.7),
       k=st.integers(1, 4))
def test_mcs_covering_properties(seed, n, p, k):
    """Def 5.4 properties (1) and (2) hold for the computed MCS."""
    d = _random_dag(seed, n, p)
    rng = random.Random(seed + 2)
    m = set(rng.sample(d.vertices, min(k, len(d.vertices))))
    mcs = find_mcs(d, m)
    assert m <= set(mcs.vertices)
    for a in m:
        for b in m:
            if a != b:
                for path in d.paths(a, b):
                    assert set(path) <= set(mcs.vertices)
                    assert set(zip(path, path[1:])) <= set(mcs.edges)


class TestComponents:
    def test_fig7_two_components(self):
        d = fig5_dag()
        mcs = find_mcs(d, {"C", "F", "G"})
        comps = components(d, mcs)
        assert sorted(sorted(c.vertices) for c in comps) == [
            ["C", "D", "E", "F"],
            ["G"],
        ]

    def test_each_component_has_reconfig_operator(self):
        """Lemma 5.6 on random inputs."""
        for seed in range(25):
            d = _random_dag(seed, 7, 0.4)
            rng = random.Random(seed)
            m = set(rng.sample(d.vertices, 3))
            comps = components(d, find_mcs(d, m))
            for c in comps:
                assert set(c.vertices) & m, (seed, m, c)

    def test_components_partition_mcs(self):
        d = fig5_dag()
        mcs = find_mcs(d, {"C", "F", "G"})
        comps = components(d, mcs)
        union = set()
        for c in comps:
            assert not (union & set(c.vertices))
            union |= set(c.vertices)
        assert union == set(mcs.vertices)

    def test_head_operators_fig7(self):
        d = fig5_dag()
        comps = components(d, find_mcs(d, {"C", "F", "G"}))
        heads = {tuple(head_operators(c)) for c in comps}
        assert heads == {("C",), ("G",)}

    def test_head_of_singleton(self):
        d = fig5_dag()
        comps = components(d, find_mcs(d, {"D"}))
        assert head_operators(comps[0]) == ["D"]

    def test_multi_head_component(self):
        # J5, J6 -> U1 -> J8: reconfig {J5, J6, J8} makes both J5, J6 heads.
        d = DAG.from_edges([("J5", "U1"), ("J6", "U1"), ("U1", "J8")])
        comps = components(d, find_mcs(d, {"J5", "J6", "J8"}))
        assert len(comps) == 1
        assert head_operators(comps[0]) == ["J5", "J6"]
