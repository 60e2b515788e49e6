"""Export a trained pipeline into the unified IR ("ONNX conversion").

Mirrors what ``skl2onnx`` + ``onnxconverter_common`` do for Raven: the
fitted featurizers become Scaler / OneHotEncoder nodes, the model becomes a
LinearClassifier or TreeEnsembleClassifier, glued by Concat. The emitted
graph matches the paper's Fig 2 ②:

    inputs(num...) -> Concat -> Scaler ┐
    input(cat) -> OneHotEncoder ... ───┴-> Concat -> Model

Gradient-boosting learning rate is folded into leaf values at export so the
ensemble is ``base_score + Σ tree(x)`` — the form MLtoSQL and MLtoDNN
compile.
"""
from __future__ import annotations

import numpy as np

from repro.ir.graph import Node, Pipeline
from repro.ir.tree import Tree
from repro.ml.ensemble import GradientBoosting, RandomForest
from repro.ml.linear import LogisticRegression
from repro.ml.pipeline import TrainedPipeline
from repro.ml.tree import DecisionTree


def build_pipeline_ir(tp: TrainedPipeline) -> Pipeline:
    """TrainedPipeline -> IR :class:`~repro.ir.graph.Pipeline`."""
    nodes: dict[str, Node] = {}

    def add(node: Node) -> str:
        nodes[node.id] = node
        return node.id

    feature_inputs: list[str] = []

    if tp.num_cols:
        num_ids = [
            add(Node("input", [], {"name": c, "kind": "num"})) for c in tp.num_cols
        ]
        cat_id = add(Node("concat", num_ids, {}))
        scaler_id = add(
            Node(
                "scaler",
                [cat_id],
                {
                    "offset": np.asarray(tp.scaler.mean_, dtype=np.float64),
                    # ml.StandardScaler stores scale_ = 1/std already in
                    # ONNX Scaler semantics: (x - offset) * scale.
                    "scale": np.asarray(tp.scaler.scale_, dtype=np.float64),
                },
            )
        )
        feature_inputs.append(scaler_id)

    for c in tp.cat_cols:
        in_id = add(Node("input", [], {"name": c, "kind": "cat"}))
        feature_inputs.append(
            add(Node("onehot", [in_id], {"categories": list(tp.encoders[c].categories_)}))
        )

    concat_id = add(Node("concat", feature_inputs, {}))
    model_id = add(_model_node(tp.model, tp.model_kind, concat_id))
    p = Pipeline(nodes, model_id, list(tp.input_cols))
    p.validate()
    return p


def _model_node(model, kind: str, input_id: str) -> Node:
    if kind == "lr":
        assert isinstance(model, LogisticRegression)
        return Node(
            "linear_classifier",
            [input_id],
            {
                "coef": np.asarray(model.coef_, dtype=np.float64),
                "intercept": float(model.intercept_),
            },
        )
    if kind == "dt":
        assert isinstance(model, DecisionTree)
        return Node(
            "tree_ensemble",
            [input_id],
            {"trees": [model.tree_], "kind": "dt", "base_score": 0.0},
        )
    if kind == "rf":
        assert isinstance(model, RandomForest)
        return Node(
            "tree_ensemble",
            [input_id],
            {"trees": list(model.trees_), "kind": "rf", "base_score": 0.0},
        )
    if kind == "gb":
        assert isinstance(model, GradientBoosting)
        lr = float(model.learning_rate)
        trees = [
            Tree(t.feature, t.threshold, t.left, t.right, t.value * lr)
            for t in model.trees_
        ]
        return Node(
            "tree_ensemble",
            [input_id],
            {"trees": trees, "kind": "gb", "base_score": float(model.base_score_)},
        )
    raise ValueError(f"unknown model kind {kind!r}")
