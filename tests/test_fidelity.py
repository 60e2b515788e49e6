"""§7.4 "Prediction accuracy" — quantify transformation rounding error.

Paper: across 30 models, MLtoSQL changed 0.006–0.3% of predictions and
MLtoDNN less than 0.8%; such rounding differences are considered
acceptable for ML converters. This module measures the same rates for our
compilers over the evaluation datasets.
"""
import duckdb
import numpy as np
import pytest

from repro.core.ml2sql import compile_to_sql
from repro.data import datasets as ds
from repro.experiments.common import dataset_pipeline
from repro.runtime import onnx_rt
from repro.runtime.dnn_rt import compile_to_dnn

CASES = [
    ("creditcard", "lr"),
    ("creditcard", "dt"),
    ("creditcard", "gb"),
    ("hospital", "lr"),
    ("hospital", "dt"),
    ("hospital", "gb"),
    ("hospital", "rf"),
]


@pytest.fixture(scope="module")
def frames():
    return {
        name: ds.joined_frame(name, 20_000, seed=77)
        for name in {n for n, _ in CASES}
    }


@pytest.mark.parametrize("name,kind", CASES)
def test_mltosql_mismatch_rate(frames, name, kind):
    p = dataset_pipeline(name, kind)
    pdf = frames[name]
    sqlp = compile_to_sql(p)
    con = duckdb.connect()
    try:
        con.register("t", pdf)
        out = con.execute(
            f"SELECT {sqlp.label_sql} AS prediction FROM t"
        ).fetchnumpy()["prediction"]
    finally:
        con.close()
    label_rt, _ = onnx_rt.run(p, pdf)
    rate = float(np.mean(out != label_rt))
    print(f"MLtoSQL mismatch {name}/{kind}: {rate:.4%}")
    assert rate <= 0.005  # paper: 0.006%-0.3%


@pytest.mark.parametrize("name,kind", CASES)
def test_mltodnn_mismatch_rate(frames, name, kind):
    p = dataset_pipeline(name, kind)
    pdf = frames[name]
    l_dnn, _ = compile_to_dnn(p).predict(pdf)
    l_rt, _ = onnx_rt.run(p, pdf)
    rate = float(np.mean(l_dnn != l_rt))
    print(f"MLtoDNN mismatch {name}/{kind}: {rate:.4%}")
    assert rate <= 0.01  # paper: < 0.8%
