"""Tests for the balanced label-propagation partitioner (METIS stand-in)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.partition.lpa import _incidence, partition
from repro.partition.quality import balance, edge_cut_rate
from repro.oracle import assert_equivalent


def _clique_graph(spark, n_cliques=4, size=12, bridge_w=0.5):
    """n_cliques cliques of `size`, chained by single weak bridges."""
    edges = []
    for c in range(n_cliques):
        base = c * size
        for i in range(size):
            for j in range(i + 1, size):
                edges.append((base + i, base + j, 1.0))
        if c:
            edges.append((base - 1, base, bridge_w))
    pdf = pd.DataFrame(edges, columns=["src", "dst", "weight"])
    nodes = pd.DataFrame({"node": range(n_cliques * size)})
    return spark.createDataFrame(pdf), spark.createDataFrame(nodes)


def test_recovers_cliques(spark):
    edges, nodes = _clique_graph(spark)
    parts = partition(spark, edges, nodes, 4, seed=3).toPandas()
    # Every clique should land (almost) entirely in one part.
    grouped = parts.assign(clique=parts.node // 12).groupby("clique").part
    purity = grouped.apply(lambda s: s.value_counts().iloc[0] / len(s)).min()
    assert purity >= 0.9, f"clique purity too low: {purity}"


def test_balance_respected(spark):
    edges, nodes = _clique_graph(spark, n_cliques=3, size=10)
    parts_df = partition(spark, edges, nodes, 3, slack=0.1, seed=1)
    assert balance(parts_df, 3) <= 1.1 + 1e-9
    assert parts_df.count() == 30


def test_every_node_assigned_in_range(spark):
    edges, nodes = _clique_graph(spark)
    parts = partition(spark, edges, nodes, 4, seed=0).toPandas()
    assert set(parts.node) == set(range(48))
    assert parts.part.between(0, 3).all()


def test_k1_trivial(spark):
    edges, nodes = _clique_graph(spark, n_cliques=2, size=5)
    parts = partition(spark, edges, nodes, 1).toPandas()
    assert (parts.part == 0).all()


def test_isolated_nodes_get_parts(spark):
    edges = spark.createDataFrame(pd.DataFrame({"src": [0], "dst": [1], "weight": [1.0]}))
    nodes = spark.createDataFrame(pd.DataFrame({"node": range(10)}))
    parts = partition(spark, edges, nodes, 2, seed=5).toPandas()
    assert len(parts) == 10
    assert set(parts.part) <= {0, 1}


def test_deterministic(spark):
    edges, nodes = _clique_graph(spark)
    a = partition(spark, edges, nodes, 4, seed=9).toPandas().sort_values("node")
    b = partition(spark, edges, nodes, 4, seed=9).toPandas().sort_values("node")
    assert (a.part.to_numpy() == b.part.to_numpy()).all()


def test_zero_weight_edges_do_not_attract(spark):
    # Two cliques joined by many zero-weight edges must still separate.
    edges, nodes = _clique_graph(spark, n_cliques=2, size=10)
    zero = spark.createDataFrame(
        pd.DataFrame({"src": list(range(10)), "dst": list(range(10, 20)), "weight": [0.0] * 10})
    )
    parts = partition(spark, edges.union(zero), nodes, 2, seed=2).toPandas()
    left = set(parts[parts.node < 10].part)
    right = set(parts[parts.node >= 10].part)
    assert len(left) == 1 and len(right) == 1 and left != right


def test_high_weight_edges_bind(spark):
    # A chain of high-weight edges across clique borders drags those
    # nodes together: the heavy pair must be co-located.
    edges, nodes = _clique_graph(spark, n_cliques=2, size=8)
    heavy = spark.createDataFrame(
        pd.DataFrame({"src": [0], "dst": [8], "weight": [1000.0]})
    )
    parts = partition(spark, edges.union(heavy), nodes, 2, seed=4).toPandas()
    p = dict(zip(parts.node, parts.part))
    assert p[0] == p[8]


def test_incidence_symmetric_and_summed(spark):
    edges = spark.createDataFrame(
        pd.DataFrame(
            {"src": [1, 1, 2], "dst": [2, 2, 3], "weight": [1.0, 2.0, 0.0]}
        )
    )
    inc = _incidence(edges)
    assert_equivalent(
        inc,
        """
        WITH e AS (
          SELECT src, dst, weight FROM edges WHERE weight > 0
          UNION ALL
          SELECT dst AS src, src AS dst, weight FROM edges WHERE weight > 0
        )
        SELECT src AS u, dst AS v, SUM(weight) AS w FROM e
        WHERE src <> dst GROUP BY 1, 2
        """,
        edges=edges,
    )


def test_edge_cut_rate_oracle(spark):
    triples = spark.createDataFrame(
        pd.DataFrame({"h": [0, 0, 2, 3], "r": [0, 0, 0, 0], "t": [1, 2, 3, 0]})
    )
    parts = spark.createDataFrame(
        pd.DataFrame({"node": [0, 1, 2, 3], "part": [0, 0, 1, 1]})
    )
    got = edge_cut_rate(triples, parts)
    assert got == pytest.approx(2 / 4)
