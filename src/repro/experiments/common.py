"""Shared setup for the experiment harnesses: scaled datasets on Spark,
cached trained pipelines, and the corpus-trained optimization strategy."""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.corpus import build_corpus
from repro.core.optimizer import OptimizerConfig
from repro.core.session import RavenSession
from repro.core.strategies import ClassificationStrategy
from repro.data import datasets as ds
from repro.ir.builder import build_pipeline_ir
from repro.ir.graph import Pipeline

#: benchmark-scale fact-table row counts (paper scales in EXPERIMENTS.md);
#: wide one-hot datasets run fewer rows to bound per-batch matrices.
BENCH_ROWS = {
    "creditcard": 400_000,
    "hospital": 400_000,
    "expedia": 100_000,
    "flights": 50_000,
}

#: fig6/fig8 model settings (paper §7.1.1: DT depth 8; LR with L1; GB 20x3)
MODEL_SETTINGS = {
    "lr": {"l1": 0.02},
    "dt": {"max_depth": 8},
    "gb": {"max_depth": 3, "n_estimators": 20},
    "rf": {"max_depth": 8, "n_estimators": 20},
}


@dataclass
class DatasetEnv:
    name: str
    spec: ds.DatasetSpec
    tables: dict[str, pd.DataFrame]
    catalog: dict[str, DataFrame]
    n_rows: int

    @property
    def table_cols(self) -> dict[str, list[str]]:
        return {
            n: [c for c in p.columns if c != ds.LABEL]
            for n, p in self.tables.items()
        }

    def session(self, config: OptimizerConfig, spark: SparkSession) -> RavenSession:
        return RavenSession(spark, self.catalog, self.table_cols, config=config)


_ENV_CACHE: dict[tuple[str, int], DatasetEnv] = {}


def dataset_env(spark: SparkSession, name: str, n_rows: int, seed: int = 0) -> DatasetEnv:
    """Generate + register + cache the dataset's Spark tables (cached so a
    harness sweep pays generation once)."""
    key = (name, n_rows)
    if key in _ENV_CACHE:
        return _ENV_CACHE[key]
    spec = ds.get_spec(name)
    tables = ds.generate(name, n_rows, seed=seed)
    catalog = {}
    for tname, pdf in tables.items():
        df = spark.createDataFrame(pdf).cache()
        df.count()  # materialize so timings exclude the driver-side upload
        catalog[tname] = df
    env = DatasetEnv(name, spec, tables, catalog, n_rows)
    _ENV_CACHE[key] = env
    return env


def release_env(name: str, n_rows: int) -> None:
    env = _ENV_CACHE.pop((name, n_rows), None)
    if env:
        for df in env.catalog.values():
            df.unpersist()


def dataset_pipeline(name: str, kind: str, **hp) -> Pipeline:
    """Cached trained pipeline -> IR for a dataset/model combination."""
    merged = {**MODEL_SETTINGS.get(kind, {}), **hp}
    tp = ds.train_pipeline_for(name, kind, **merged)
    return build_pipeline_ir(tp)


_STRATEGIES: dict[str, ClassificationStrategy] = {}


def classification_strategy(
    engine: str = "duckdb", spark: SparkSession | None = None
) -> ClassificationStrategy:
    """The paper's preferred strategy, trained once per *engine* on the
    cached corpus — §5.2 calibrates strategies on the deployment setup, so
    Spark experiments use the Spark-priced corpus and the SQL Server
    experiments the single-node one."""
    if engine not in _STRATEGIES:
        if engine == "spark":
            from repro.core.corpus import build_corpus_spark

            assert spark is not None, "spark session required for engine='spark'"
            entries = build_corpus_spark(spark)
        else:
            entries = build_corpus()
        _STRATEGIES[engine] = ClassificationStrategy().fit(entries)
    return _STRATEGIES[engine]
