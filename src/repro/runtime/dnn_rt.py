"""MLtoDNN tensor runtime — Hummingbird's strategies in NumPy (§5.1).

Two tensor compilation strategies, chosen per tree size exactly as
Hummingbird does (Nakandala et al., OSDI'20):

**GEMM** (small trees):

- ``S = (X @ A) <= B``: A one-hot-encodes split features over internal
  nodes, B holds thresholds; S says, per row, which splits route left.
- ``T = S @ C``; leaf ``l`` is reached iff ``T[l] == D[l]`` where C holds
  +1 for left-edge ancestors, -1 for right-edge ancestors, and D counts
  left-edge ancestors.
- ``Y = onehot(T == D) @ V``: gather leaf payloads.

**(Perfect)TreeTraversal** (larger trees, where GEMM's dense
node-by-feature matrices explode): all trees padded into stacked arrays
and traversed level-synchronously with batched gather ops — ``depth``
tensor iterations instead of ``n_trees x depth`` scalar-driven loops.

The "DNN runtime" here is NumPy — the tensor-kernel substitute for
PyTorch/ORT in this container (see DESIGN.md). :mod:`repro.runtime.gpu_sim`
prices the same tensor program on a modeled GPU.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.ir.graph import Pipeline
from repro.ir.tree import LEAF, Tree
from repro.ml.ensemble import sigmoid


@dataclass
class TreeGemm:
    """Dense tensors for one tree (single-leaf trees keep ``A`` empty)."""

    A: np.ndarray  # (d, I)
    B: np.ndarray  # (I,)
    C: np.ndarray  # (I, L)
    D: np.ndarray  # (L,)
    V: np.ndarray  # (L, n_out)

    def run(self, X: np.ndarray) -> np.ndarray:
        if self.A.shape[1] == 0:  # no internal nodes
            return np.broadcast_to(self.V[0], (X.shape[0], self.V.shape[1])).copy()
        S = (X @ self.A <= self.B).astype(np.float32)
        T = S @ self.C
        hit = (T == self.D).astype(np.float32)
        return hit @ self.V

    def flops(self, n_rows: int) -> int:
        d, i = self.A.shape
        l, o = self.V.shape
        return 2 * n_rows * (d * i + i * l + l * o)

    def param_bytes(self) -> int:
        return sum(m.nbytes for m in (self.A, self.B, self.C, self.D, self.V))


def compile_tree(t: Tree, n_features: int) -> TreeGemm:
    internal = [n for n in range(t.n_nodes) if t.left[n] != LEAF]
    leaves = [n for n in range(t.n_nodes) if t.left[n] == LEAF]
    int_pos = {n: i for i, n in enumerate(internal)}
    leaf_pos = {n: i for i, n in enumerate(leaves)}
    I, L = len(internal), len(leaves)

    A = np.zeros((n_features, I), dtype=np.float32)
    B = np.zeros(I, dtype=np.float32)
    for n, i in int_pos.items():
        A[int(t.feature[n]), i] = 1.0
        B[i] = np.float32(t.threshold[n])
    C = np.zeros((I, L), dtype=np.float32)
    D = np.zeros(L, dtype=np.float32)

    def walk(node: int, path: list[tuple[int, int]]) -> None:
        if t.left[node] == LEAF:
            li = leaf_pos[node]
            for anc, sign in path:
                C[int_pos[anc], li] = sign
            D[li] = sum(1 for _, s in path if s > 0)
            return
        walk(int(t.left[node]), path + [(node, +1)])
        walk(int(t.right[node]), path + [(node, -1)])

    walk(0, [])
    V = t.value[leaves].astype(np.float32)
    return TreeGemm(A, B, C, D, V)


#: Hummingbird-style strategy cutoff: trees with more internal nodes than
#: this use the traversal strategy instead of dense GEMM.
GEMM_MAX_INTERNAL = 16


@dataclass
class TreeTravEnsemble:
    """Padded stacked-tree tensors for the TreeTraversal strategy.

    Leaves self-loop (left == right == self), so ``depth`` gather
    iterations park every row at its leaf regardless of tree shape.
    """

    feature: np.ndarray  # (T, N) int32
    threshold: np.ndarray  # (T, N) float32
    left: np.ndarray  # (T, N) int32
    right: np.ndarray  # (T, N) int32
    value: np.ndarray  # (T, N, n_out) float32
    depth: int

    @property
    def n_trees(self) -> int:
        return self.feature.shape[0]

    def run_sum(self, X: np.ndarray) -> np.ndarray:
        """Sum of per-tree leaf payloads: (n, n_out)."""
        n = X.shape[0]
        T = self.n_trees
        t_ar = np.arange(T)[None, :]  # (1, T)
        idx = np.zeros((n, T), dtype=np.int32)
        rows = np.arange(n)[:, None]
        for _ in range(self.depth):
            f = self.feature[t_ar, idx]  # (n, T)
            xv = X[rows, f]
            go_left = xv <= self.threshold[t_ar, idx]
            idx = np.where(go_left, self.left[t_ar, idx], self.right[t_ar, idx])
        vals = self.value[t_ar, idx]  # (n, T, n_out)
        return vals.sum(axis=1, dtype=np.float64)

    def flops(self, n_rows: int) -> int:
        # gather/compare/select ops per level, per row, per tree
        return 8 * n_rows * self.n_trees * self.depth

    def mem_bytes(self, n_rows: int) -> int:
        # 4 gathers x 4B + index updates per level
        return 24 * n_rows * self.n_trees * self.depth

    def param_bytes(self) -> int:
        return sum(
            m.nbytes
            for m in (self.feature, self.threshold, self.left, self.right, self.value)
        )


def compile_traversal(trees: list[Tree]) -> TreeTravEnsemble:
    T = len(trees)
    N = max(t.n_nodes for t in trees)
    n_out = trees[0].n_out
    feature = np.zeros((T, N), dtype=np.int32)
    threshold = np.zeros((T, N), dtype=np.float32)
    left = np.zeros((T, N), dtype=np.int32)
    right = np.zeros((T, N), dtype=np.int32)
    value = np.zeros((T, N, n_out), dtype=np.float32)
    depth = 0
    for ti, t in enumerate(trees):
        n = t.n_nodes
        feature[ti, :n] = t.feature
        threshold[ti, :n] = t.threshold.astype(np.float32)
        is_leaf = t.left == LEAF
        self_idx = np.arange(n, dtype=np.int32)
        left[ti, :n] = np.where(is_leaf, self_idx, t.left)
        right[ti, :n] = np.where(is_leaf, self_idx, t.right)
        value[ti, :n] = t.value
        depth = max(depth, t.depth())
    return TreeTravEnsemble(feature, threshold, left, right, value, max(depth, 1))


@dataclass
class DnnModel:
    """The tensorized pipeline: featurizers (as tensor ops via the IR
    interpreter's kernels) + GEMM tree program / dense linear layer."""

    pipeline: Pipeline
    trees: list[TreeGemm] = field(default_factory=list)
    trav: TreeTravEnsemble | None = None  # traversal strategy (big trees)
    kind: str = "dt"  # dt | rf | gb | lr
    strategy: str = "gemm"  # gemm | traversal | linear
    n_trees: int = 0
    base_score: float = 0.0
    coef: np.ndarray | None = None
    intercept: float = 0.0
    n_features: int = 0

    # -- execution ------------------------------------------------------
    def _featurize(self, pdf: pd.DataFrame) -> np.ndarray:
        from repro.runtime import onnx_rt  # featurizer kernels are tensor ops

        model = self.pipeline.model_node
        values: dict[str, np.ndarray] = {}
        for nid in self.pipeline.topo_order():
            node = self.pipeline.nodes[nid]
            if node.op in ("linear_classifier", "tree_ensemble"):
                break
            _eval_one(node, values, pdf)
        return np.hstack([values[i] for i in model.inputs]).astype(np.float32)

    def predict(self, pdf: pd.DataFrame) -> tuple[np.ndarray, np.ndarray]:
        X = self._featurize(pdf)
        if self.kind == "lr":
            margin = X @ self.coef + self.intercept
            return (margin > 0).astype(np.int64), sigmoid(margin)
        if self.strategy == "traversal":
            acc = self.trav.run_sum(X)
        else:
            acc = np.zeros((X.shape[0], self.trees[0].V.shape[1]), dtype=np.float64)
            for tg in self.trees:
                acc += tg.run(X)
        if self.kind == "gb":
            margin = acc[:, 0] + self.base_score
            return (margin > 0).astype(np.int64), sigmoid(margin)
        proba = acc / self.n_trees
        label = np.argmax(proba, axis=1).astype(np.int64)
        return label, proba[:, 1] if proba.shape[1] > 1 else proba[:, 0]

    # -- cost metadata for the GPU model --------------------------------
    def flops(self, n_rows: int) -> int:
        if self.kind == "lr":
            return 2 * n_rows * len(self.coef)
        if self.strategy == "traversal":
            return self.trav.flops(n_rows)
        return int(sum(t.flops(n_rows) for t in self.trees))

    def mem_bytes(self, n_rows: int) -> int:
        """Device memory traffic (roofline memory term)."""
        if self.strategy == "traversal":
            return self.trav.mem_bytes(n_rows)
        return self.input_bytes(n_rows) + self.param_bytes()

    def param_bytes(self) -> int:
        if self.kind == "lr":
            return int(self.coef.nbytes)
        if self.strategy == "traversal":
            return self.trav.param_bytes()
        return int(sum(t.param_bytes() for t in self.trees))

    def input_bytes(self, n_rows: int) -> int:
        return 4 * n_rows * self.n_features


def _eval_one(node, values: dict, pdf: pd.DataFrame) -> None:
    """Single-node featurizer kernels (shared semantics with onnx_rt)."""
    if node.op == "input":
        col = node.attrs["name"]
        if node.attrs["kind"] == "num":
            values[node.id] = pdf[col].to_numpy(dtype=np.float64)[:, None]
        else:
            values[node.id] = pdf[col].astype(str).to_numpy()[:, None]
    elif node.op == "constant":
        v = node.attrs["value"]
        values[node.id] = (
            np.full((len(pdf), 1), v, dtype=object)
            if isinstance(v, str)
            else np.full((len(pdf), 1), float(v))
        )
    elif node.op == "scaler":
        values[node.id] = (values[node.inputs[0]] - node.attrs["offset"]) * node.attrs["scale"]
    elif node.op == "onehot":
        col = values[node.inputs[0]][:, 0]
        cats = node.attrs["categories"]
        codes = pd.Index(cats).get_indexer(pd.Index(col))
        out = np.zeros((len(col), len(cats)), dtype=np.float64)
        rows = np.flatnonzero(codes >= 0)
        out[rows, codes[rows]] = 1.0
        values[node.id] = out
    elif node.op == "concat":
        values[node.id] = np.hstack([values[i] for i in node.inputs])
    elif node.op == "feature_extractor":
        values[node.id] = values[node.inputs[0]][:, node.attrs["indices"]]
    else:  # pragma: no cover
        raise ValueError(f"unexpected op {node.op}")


def compile_to_dnn(p: Pipeline) -> DnnModel:
    """MLtoDNN entry point: IR pipeline -> tensorized model."""
    model = p.model_node
    d = p.n_model_features()
    if model.op == "linear_classifier":
        return DnnModel(
            pipeline=p,
            kind="lr",
            coef=np.asarray(model.attrs["coef"], dtype=np.float32),
            intercept=float(model.attrs["intercept"]),
            n_features=d,
        )
    trees = model.attrs["trees"]
    max_internal = max(t.n_nodes - t.n_leaves for t in trees)
    if max_internal > GEMM_MAX_INTERNAL:
        return DnnModel(
            pipeline=p,
            trav=compile_traversal(trees),
            kind=model.attrs["kind"],
            strategy="traversal",
            n_trees=len(trees),
            base_score=float(model.attrs.get("base_score", 0.0)),
            n_features=d,
        )
    return DnnModel(
        pipeline=p,
        trees=[compile_tree(t, d) for t in trees],
        kind=model.attrs["kind"],
        strategy="gemm",
        n_trees=len(trees),
        base_score=float(model.attrs.get("base_score", 0.0)),
        n_features=d,
    )
