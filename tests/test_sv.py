"""Tests for the simplified S-V connected-components PPA."""
import numpy as np
import pytest

from repro.core.sv import sv_components
from repro.pregel.engine import PregelStats


def _uf_components(n_ids, edges):
    """Union-find ground truth: id → min id of its component."""
    parent = {i: i for i in n_ids}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for u, v in edges:
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    return {i: find(i) for i in n_ids}


def _run(spark, ids, edges):
    v = spark.createDataFrame([(int(i),) for i in ids], "id long")
    e = (
        spark.createDataFrame([(int(a), int(b)) for a, b in edges], "u long, v long")
        if edges
        else spark.createDataFrame([], "u long, v long")
    )
    st = PregelStats("sv")
    got = {r.id: r.label for r in sv_components(spark, v, e, st).collect()}
    return got, st


class TestSV:
    def test_singletons(self, spark):
        got, _ = _run(spark, [3, 7, 9], [])
        assert got == {3: 3, 7: 7, 9: 9}

    def test_single_edge(self, spark):
        got, _ = _run(spark, [5, 2], [(5, 2)])
        assert got == {5: 2, 2: 2}

    def test_path(self, spark):
        ids = list(range(1, 30))
        edges = list(zip(ids, ids[1:]))
        got, st = _run(spark, ids, edges)
        assert set(got.values()) == {1}
        assert st.supersteps == 4 * st.rounds

    def test_star(self, spark):
        ids = [50] + list(range(1, 10))
        edges = [(50, i) for i in range(1, 10)]
        got, _ = _run(spark, ids, edges)
        assert set(got.values()) == {1}

    def test_cycle(self, spark):
        ids = [4, 8, 15, 16, 23, 42]
        edges = list(zip(ids, ids[1:])) + [(ids[-1], ids[0])]
        got, _ = _run(spark, ids, edges)
        assert set(got.values()) == {4}

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_random_graphs_match_union_find(self, spark, seed):
        rng = np.random.default_rng(seed)
        n = 120
        ids = list(rng.permutation(5000)[:n] + 1)
        m = 100
        edges = [
            (int(ids[rng.integers(n)]), int(ids[rng.integers(n)])) for _ in range(m)
        ]
        edges = [(u, v) for u, v in edges if u != v]
        got, _ = _run(spark, ids, edges)
        want = _uf_components([int(i) for i in ids], edges)
        assert got == want

    def test_logarithmic_rounds_on_path(self, spark):
        ids = list(range(1, 200))
        edges = list(zip(ids, ids[1:]))
        _, st = _run(spark, ids, edges)
        assert st.rounds <= 20  # O(log n) with a generous constant
