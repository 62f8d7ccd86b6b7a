"""Tests for bidirectional list ranking (paper Fig. 11 semantics)."""
import math

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.listrank import list_rank
from repro.dna.codec import flip
from repro.pregel.engine import PregelStats


def _path_pairs(spark, ids):
    """Initial predecessor pairs for a path of the given vertex ids
    (ends hold their own flipped id on the missing side)."""
    rows = []
    for i, v in enumerate(ids):
        s0 = ids[i - 1] if i > 0 else flip(v)
        s1 = ids[i + 1] if i < len(ids) - 1 else flip(v)
        rows.append((int(v), int(s0), int(s1)))
    return spark.createDataFrame(rows, "id long, s0 long, s1 long")


def _path_edges(spark, ids):
    rows = [(int(min(a, b)), int(max(a, b))) for a, b in zip(ids, ids[1:])]
    if not rows:
        return spark.createDataFrame([], "u long, v long")
    return spark.createDataFrame(rows, "u long, v long")


def _cycle_pairs(spark, ids):
    n = len(ids)
    rows = [
        (int(ids[i]), int(ids[(i - 1) % n]), int(ids[(i + 1) % n]))
        for i in range(n)
    ]
    return spark.createDataFrame(rows, "id long, s0 long, s1 long")


def _cycle_edges(spark, ids):
    n = len(ids)
    rows = [
        (int(min(ids[i], ids[(i + 1) % n])), int(max(ids[i], ids[(i + 1) % n])))
        for i in range(n)
    ]
    return spark.createDataFrame(rows, "u long, v long")


def _labels(df):
    return {r.id: r.label for r in df.collect()}


class TestPaths:
    @pytest.mark.parametrize("n", [1, 2, 3, 5, 17, 64])
    def test_single_path_single_label(self, spark, n):
        ids = np.random.default_rng(n).permutation(1000)[:n] + 1
        st = PregelStats("lr")
        lab = _labels(
            list_rank(spark, _path_pairs(spark, ids), _path_edges(spark, ids), st)
        )
        assert set(lab) == set(int(i) for i in ids)
        assert len(set(lab.values())) == 1
        # label is the smaller flipped end id
        assert lab[int(ids[0])] == min(flip(int(ids[0])), flip(int(ids[-1])))

    def test_logarithmic_rounds(self, spark):
        ids = np.arange(1, 130)  # path of 129 vertices
        st = PregelStats("lr")
        list_rank(spark, _path_pairs(spark, ids), _path_edges(spark, ids), st)
        assert st.rounds <= math.ceil(math.log2(len(ids))) + 2
        assert st.supersteps == 2 * st.rounds

    def test_multiple_paths(self, spark):
        a, b, c = [1, 2, 3, 4], [10, 11], [20]
        pairs = (
            _path_pairs(spark, a)
            .unionByName(_path_pairs(spark, b))
            .unionByName(_path_pairs(spark, c))
        )
        edges = (
            _path_edges(spark, a)
            .unionByName(_path_edges(spark, b))
            .unionByName(_path_edges(spark, c))
        )
        st = PregelStats("lr")
        lab = _labels(list_rank(spark, pairs, edges, st))
        assert len({lab[v] for v in a}) == 1
        assert len({lab[v] for v in b}) == 1
        assert len({lab[1], lab[10], lab[20]}) == 3

    def test_paper_figure11_doubling(self, spark):
        """5-vertex path finishes in ≤3 rounds (2^r-hop doubling)."""
        ids = [164, 105, 26, 108, 177]
        st = PregelStats("lr")
        lab = _labels(
            list_rank(spark, _path_pairs(spark, ids), _path_edges(spark, ids), st)
        )
        assert len(set(lab.values())) == 1
        assert st.rounds <= 3


class TestCycles:
    @pytest.mark.parametrize("n", [3, 8, 20])
    def test_pure_cycle_falls_back_to_sv(self, spark, n):
        ids = np.random.default_rng(n).permutation(900)[:n] + 1
        st = PregelStats("lr")
        lab = _labels(
            list_rank(spark, _cycle_pairs(spark, ids), _cycle_edges(spark, ids), st)
        )
        assert set(lab) == set(int(i) for i in ids)
        assert set(lab.values()) == {int(min(ids))}  # S-V: min id in cycle

    def test_mixed_path_and_cycle(self, spark):
        path, cyc = [1, 2, 3, 4, 5, 6, 7], [100, 101, 102, 103]
        pairs = _path_pairs(spark, path).unionByName(_cycle_pairs(spark, cyc))
        edges = _path_edges(spark, path).unionByName(_cycle_edges(spark, cyc))
        st = PregelStats("lr")
        lab = _labels(list_rank(spark, pairs, edges, st))
        assert len({lab[v] for v in path}) == 1
        assert {lab[v] for v in cyc} == {100}
        assert lab[1] != lab[100]

    def test_two_cycle(self, spark):
        lab = _labels(
            list_rank(
                spark,
                _cycle_pairs(spark, [5, 9]),
                _cycle_edges(spark, [5, 9]),
                PregelStats("lr"),
            )
        )
        assert set(lab.values()) == {5}


class TestMessages:
    def test_message_count_positive_and_even(self, spark):
        ids = np.arange(1, 20)
        st = PregelStats("lr")
        list_rank(spark, _path_pairs(spark, ids), _path_edges(spark, ids), st)
        assert st.messages > 0
        assert st.messages % 2 == 0  # request + response pairs
