"""Smoke tests for the table harnesses at tiny scale (the jobs/ scripts
run the full-size versions; these verify structure and N/A handling)."""
import numpy as np

from repro.data import mldata
from repro.experiments import (
    MODE_LABEL,
    format_rows,
    table3_rows,
    table4_rows,
    table5_rows,
)


def test_table3_structure():
    rows = table3_rows(n_mnist=800)
    assert {r["algorithm"] for r in rows} == {
        "L2SVM", "MLogreg", "GLM", "KMeans", "ALS-CG", "AutoEncoder",
    }
    for r in rows:
        dags, cplans, classes = map(int, r["compile(dags/cplans/classes)"].split("/"))
        assert dags >= 1 and cplans >= 1 and classes >= 1
        assert r["codegen_ms"] >= 0


def test_table4_structure_mini():
    mini = {"tiny": mldata.dense_features(3000, 10, seed=1)}
    rows = table4_rows(datasets=mini, iters=2)
    assert len(rows) == 4  # four algorithms × one dataset
    for r in rows:
        for lbl in MODE_LABEL.values():
            assert isinstance(r[lbl], float)


def test_table5_na_for_infeasible_dense_modes(monkeypatch):
    import repro.experiments as ex

    # force every ALS dataset over the N/A threshold
    monkeypatch.setattr(ex, "NA_DENSE_BYTES", 0.0)
    monkeypatch.setattr(
        ex, "table5_datasets", lambda: {"t": mldata.netflix_like(300, 200)}
    )
    monkeypatch.setattr(
        ex,
        "table5_ae_datasets",
        lambda: {"ae": mldata.dense_features(256, 16, seed=0)},
    )
    rows = [r for r in ex.table5_rows() if r["algorithm"] == "ALS-CG"]
    (row,) = rows
    assert row["Base"] == "N/A" and row["FA"] == "N/A" and row["FNR"] == "N/A"
    assert isinstance(row["Gen"], float) and isinstance(row["Fused"], float)


def test_format_rows_renders_all_columns():
    out = format_rows(
        [{"a": 1, "b": "x"}, {"a": 22, "b": "yy"}], ["a", "b"]
    )
    lines = out.splitlines()
    assert len(lines) == 4
    assert "a" in lines[0] and "b" in lines[0]
