"""CSR/CSC construction: exact agreement with the edge-list DataFrame."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.graphs.csr import from_pandas, to_csr
from tests.helpers import graph_from_edges


def test_small_graph_layout():
    g = graph_from_edges([(0, 1, 0.5), (0, 2, 0.25), (2, 1, 1.0)], n=3)
    assert g.n == 3 and g.m == 3
    assert list(g.out_indptr) == [0, 2, 2, 3]
    assert sorted(g.out_dst[0:2].tolist()) == [1, 2]
    assert list(g.in_indptr) == [0, 0, 2, 3]
    assert g.m_tilde == pytest.approx(1.75)


def test_out_and_in_describe_same_edges():
    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "src": rng.integers(0, 50, 300),
            "dst": rng.integers(0, 50, 300),
            "p": rng.uniform(0.01, 1.0, 300),
        }
    )
    g = from_pandas(pdf, n=50)
    out_edges = set()
    for v in range(g.n):
        for e in range(g.out_indptr[v], g.out_indptr[v + 1]):
            out_edges.add((v, int(g.out_dst[e]), round(float(g.out_p[e]), 9)))
    in_edges = set()
    for v in range(g.n):
        for e in range(g.in_indptr[v], g.in_indptr[v + 1]):
            in_edges.add((int(g.in_src[e]), v, round(float(g.in_p[e]), 9)))
    assert out_edges == in_edges
    assert len(out_edges) == len(pdf)  # duplicates kept as parallel edges


def test_degrees_match_pandas():
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame(
        {"src": rng.integers(0, 20, 100), "dst": rng.integers(0, 20, 100)}
    )
    g = from_pandas(pdf, n=20)
    out_counts = pdf.groupby("src").size()
    for v in range(20):
        assert g.out_degree()[v] == out_counts.get(v, 0)


def test_default_p_is_one():
    g = from_pandas(pd.DataFrame({"src": [0], "dst": [1]}))
    assert g.out_p[0] == 1.0


def test_n_inferred():
    g = from_pandas(pd.DataFrame({"src": [0, 7], "dst": [3, 2]}))
    assert g.n == 8


@settings(max_examples=25, deadline=None)
@given(
    edges=st.lists(
        st.tuples(
            st.integers(0, 9), st.integers(0, 9), st.floats(0.01, 1.0)
        ),
        min_size=1,
        max_size=40,
    )
)
def test_roundtrip_property(edges):
    pdf = pd.DataFrame(edges, columns=["src", "dst", "p"])
    g = from_pandas(pdf, n=10)
    assert g.m == len(pdf)
    assert g.out_degree().sum() == g.in_degree().sum() == g.m
    assert g.m_tilde == pytest.approx(pdf["p"].sum())


def test_to_csr_spark(spark):
    df = spark.createDataFrame(
        pd.DataFrame({"src": [0, 1], "dst": [1, 2], "p": [0.5, 0.5]})
    )
    g = to_csr(df)
    assert g.n == 3 and g.m == 2
