"""UncertainGraph container invariants."""
import numpy as np
import pytest

from repro.core.uncertain import UncertainGraph


def test_from_edges_canonicalizes_orientation():
    ug = UncertainGraph.from_edges([(5, 2), (1, 3)], [0.5, 0.6], n=6)
    assert ug.edges.tolist() == [[1, 3], [2, 5]]
    assert ug.probs.tolist() == [0.6, 0.5]  # probs follow their edges


def test_rejects_bad_probs():
    with pytest.raises(ValueError):
        UncertainGraph.from_edges([(0, 1)], [0.0], n=2)
    with pytest.raises(ValueError):
        UncertainGraph.from_edges([(0, 1)], [1.5], n=2)


def test_rejects_duplicate_edges():
    with pytest.raises(ValueError):
        UncertainGraph.from_edges([(0, 1), (1, 0)], [0.5, 0.5], n=2)


def test_n_inferred():
    ug = UncertainGraph.from_edges([(0, 7)], [0.5])
    assert ug.n == 8


def test_deterministic_copy_is_independent():
    ug = UncertainGraph.from_edges([(0, 1)], [0.5], n=2)
    det = ug.deterministic()
    det[0, 0] = 99
    assert ug.edges[0, 0] == 0


def test_to_pdf_schema():
    ug = UncertainGraph.from_edges([(0, 1), (1, 2)], [0.5, 0.25], n=3)
    pdf = ug.to_pdf()
    assert list(pdf.columns) == ["u", "v", "p"]
    assert len(pdf) == 2


def test_to_df_roundtrip(spark):
    ug = UncertainGraph.from_edges([(0, 1), (1, 2)], [0.5, 0.25], n=3)
    rows = ug.to_df(spark).orderBy("u").collect()
    assert [(r.u, r.v, r.p) for r in rows] == [(0, 1, 0.5), (1, 2, 0.25)]
