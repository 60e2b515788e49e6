"""Model-projection pushdown (§4.1, model-to-data rule).

Pass 1 detects the model's unused feature slots (zero-weight coefficients /
features split on by no tree — §2.1's sparsity observation), replaces the
model with a densified version, and inserts a FeatureExtractor projecting
the used slots (the paper's Fig 3 ④).

Pass 2 pushes the FeatureExtractor toward the inputs until fixpoint
(Fig 3 ⑤): through Concat (splitting per branch, deleting empty branches),
through Scaler (subsetting offset/scale), through OneHotEncoder (subsetting
categories, dropping the whole encoder — and its input column — when no
category survives). Input columns that disappear are reported so the
relational side can prune scans and joins.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.ir.graph import Node, Pipeline, model_used_features, node_width


@dataclass
class PushdownResult:
    pipeline: Pipeline
    removed_cols: list[str] = field(default_factory=list)


def _rewire(p: Pipeline, old_id: str, new_id: str) -> None:
    """Point every consumer of ``old_id`` at ``new_id`` and drop the node."""
    for node in p.nodes.values():
        node.inputs = [new_id if i == old_id else i for i in node.inputs]
    if p.output == old_id:
        p.output = new_id
    del p.nodes[old_id]


def apply_projection_pushdown(p: Pipeline) -> PushdownResult:
    """Returns an equivalent pipeline without unused features.

    Predictions are bit-identical: only columns the model provably ignores
    are removed.
    """
    p = p.clone()
    before_cols = list(p.input_cols)
    model = p.model_node
    used = model_used_features(model)
    d = p.n_model_features()
    if len(used) == d:
        return PushdownResult(p, [])

    # Pass 1: densify the model and insert the FeatureExtractor n_uf.
    if model.op == "tree_ensemble":
        mapping = {int(f): i for i, f in enumerate(used)}
        model.attrs["trees"] = [t.remap_features(mapping) for t in model.attrs["trees"]]
    else:
        model.attrs["coef"] = np.asarray(model.attrs["coef"])[used]

    if len(used) == 0:
        # Degenerate model (single-leaf tree / all-zero LR): feed it a
        # zero-width matrix; every input column is prunable.
        const = Node("constant", [], {"value": 0.0})
        fe = Node("feature_extractor", [const.id], {"indices": []})
        p.nodes[const.id] = const
        p.nodes[fe.id] = fe
        model.inputs = [fe.id]
        p = p.gc()
        return PushdownResult(p, before_cols)

    assert len(model.inputs) == 1, "model must read one feature matrix"
    fe = Node(
        "feature_extractor", [model.inputs[0]], {"indices": [int(i) for i in used]}
    )
    p.nodes[fe.id] = fe
    model.inputs = [fe.id]

    # Pass 2: push every FeatureExtractor down until fixpoint.
    changed = True
    while changed:
        changed = False
        for fe in [n for n in list(p.nodes.values()) if n.op == "feature_extractor"]:
            if fe.id not in p.nodes:
                continue
            if _push_one(p, fe):
                changed = True
    p = p.gc()
    after = set(p.input_cols)
    return PushdownResult(p, [c for c in before_cols if c not in after])


def _push_one(p: Pipeline, fe: Node) -> bool:
    src = p.nodes[fe.inputs[0]]
    idx = fe.attrs["indices"]
    w = node_width(p, src.id)

    if idx == list(range(w)):  # identity projection
        _rewire(p, fe.id, src.id)
        return True

    if src.op == "concat":
        widths = [node_width(p, i) for i in src.inputs]
        offsets = np.concatenate([[0], np.cumsum(widths)])
        new_children: list[str] = []
        for child, off, cw in zip(src.inputs, offsets, widths):
            local = [i - off for i in idx if off <= i < off + cw]
            if not local:
                continue  # branch entirely unused -> drop (and gc parents)
            if local == list(range(cw)):
                new_children.append(child)
            else:
                child_fe = Node("feature_extractor", [child], {"indices": local})
                p.nodes[child_fe.id] = child_fe
                new_children.append(child_fe.id)
        p.nodes[fe.id] = Node("concat", new_children, {}, id=fe.id)
        return True

    if src.op == "scaler":
        inner_fe = Node("feature_extractor", list(src.inputs), {"indices": idx})
        p.nodes[inner_fe.id] = inner_fe
        p.nodes[fe.id] = Node(
            "scaler",
            [inner_fe.id],
            {
                "offset": np.asarray(src.attrs["offset"])[idx],
                "scale": np.asarray(src.attrs["scale"])[idx],
            },
            id=fe.id,
        )
        return True

    if src.op == "onehot":
        cats = src.attrs["categories"]
        p.nodes[fe.id] = Node(
            "onehot", list(src.inputs), {"categories": [cats[i] for i in idx]}, id=fe.id
        )
        return True

    if src.op == "feature_extractor":
        fe.attrs["indices"] = [src.attrs["indices"][i] for i in idx]
        fe.inputs = list(src.inputs)
        return True

    return False  # input/constant: nothing below to push through
