"""End-to-end Spark integration: RavenSession optimize+execute on all four
datasets, equivalence of optimized vs unoptimized plans, MLtoSQL checked
against the DuckDB oracle, join elimination, and the §4.2 partitioned path.
"""
import numpy as np
import pandas as pd
import pytest

from repro import oracle
from repro.core.optimizer import OptimizerConfig
from repro.core.predicate_pruning import Predicate
from repro.core.session import RavenSession, dataset_query
from repro.data import datasets as ds
from repro.ir.builder import build_pipeline_ir
from repro.ml.pipeline import fit_pipeline
from repro.runtime import spark_exec

N_ROWS = 3000


@pytest.fixture(scope="module")
def hospital_env(spark):
    spec = ds.get_spec("hospital")
    tables = ds.generate("hospital", N_ROWS, seed=31)
    catalog = spark_exec.register_pandas_tables(spark, tables)
    frame = ds.joined_frame("hospital", N_ROWS, seed=31)
    return spec, tables, catalog, frame


def _session(spark, catalog, tables, config):
    table_cols = {n: [c for c in p.columns if c != ds.LABEL] for n, p in tables.items()}
    return RavenSession(spark, catalog, table_cols, config=config)


def _pipeline(spec, frame, kind, **kw):
    tp = fit_pipeline(
        frame, spec.num_cols, spec.cat_cols, ds.LABEL, kind,
        cat_domains=spec.cat_domains or None, **kw,
    )
    return build_pipeline_ir(tp)


def _collect(df):
    pdf = df.select("prediction", "score").toPandas()
    return pdf.sort_values(["prediction", "score"]).reset_index(drop=True)


class TestHospitalEndToEnd:
    @pytest.mark.parametrize(
        "kind,kw",
        [
            ("lr", {"l1": 0.02}),
            ("dt", {"max_depth": 8}),
            ("gb", {"max_depth": 3, "n_estimators": 8}),
        ],
    )
    def test_optimized_equals_noopt(self, spark, hospital_env, kind, kw):
        spec, tables, catalog, frame = hospital_env
        p = _pipeline(spec, frame, kind, **kw)
        query = dataset_query(spec, p, tables)

        noopt = _session(spark, catalog, tables, OptimizerConfig.no_opt())
        raven = _session(
            spark, catalog, tables,
            OptimizerConfig(runtime="auto", strategy=None),
        )
        base = _collect(noopt.execute(query))
        opt = _collect(raven.execute(query))
        np.testing.assert_array_equal(
            base["prediction"].to_numpy(), opt["prediction"].to_numpy()
        )
        np.testing.assert_allclose(
            base["score"].to_numpy(), opt["score"].to_numpy(), atol=1e-5
        )

    def test_mltosql_path_matches_udf_and_oracle(self, spark, hospital_env):
        spec, tables, catalog, frame = hospital_env
        p = _pipeline(spec, frame, "dt", max_depth=6)
        query = dataset_query(spec, p, tables)
        raven = _session(spark, catalog, tables, OptimizerConfig(runtime="sql"))
        plan = raven.optimize(query)
        assert plan.runtime == "sql"
        df = raven.execute_plan(plan)
        # oracle: run the very same generated SQL on DuckDB over the input
        oracle.assert_equivalent(
            df.groupBy("prediction").count().withColumnRenamed("count", "n"),
            f"SELECT {plan.sql.label_sql} AS prediction, COUNT(*) AS n "
            f"FROM hospital GROUP BY 1",
            hospital=tables["hospital"],
        )
        # and the UDF path agrees row-count-wise per class
        udf_df = _session(
            spark, catalog, tables, OptimizerConfig(runtime="none")
        ).execute(query)
        a = df.groupBy("prediction").count().toPandas().set_index("prediction")
        b = udf_df.groupBy("prediction").count().toPandas().set_index("prediction")
        assert abs(a["count"].sub(b["count"], fill_value=0)).sum() <= 0.006 * N_ROWS

    def test_where_predicate_applied_and_model_pruned(self, spark, hospital_env):
        spec, tables, catalog, frame = hospital_env
        p = _pipeline(spec, frame, "dt", max_depth=10)
        preds = [Predicate("asthma", "=", "1")]
        query = dataset_query(spec, p, tables, where=preds)
        raven = _session(spark, catalog, tables, OptimizerConfig(runtime="none"))
        plan = raven.optimize(query)
        assert "asthma" not in plan.input_cols
        df = raven.execute_plan(plan)
        out = df.toPandas()
        expected = frame[frame.asthma == "1"]
        assert len(out) == len(expected)

    def test_output_filter(self, spark, hospital_env):
        spec, tables, catalog, frame = hospital_env
        p = _pipeline(spec, frame, "dt", max_depth=8)
        query = dataset_query(spec, p, tables, output_filter=("prediction", 1))
        raven = _session(spark, catalog, tables, OptimizerConfig(runtime="none"))
        out = raven.execute(query).toPandas()
        assert (out["prediction"] == 1).all()
        noopt = _session(spark, catalog, tables, OptimizerConfig.no_opt())
        base = noopt.execute(
            dataset_query(spec, p, tables)
        ).toPandas()
        assert len(out) == int((base["prediction"] == 1).sum())

    def test_partitioned_models_equal_global(self, spark, hospital_env):
        spec, tables, catalog, frame = hospital_env
        p = _pipeline(spec, frame, "dt", max_depth=10)
        query = dataset_query(spec, p, tables, partition_col="rcount")
        raven = _session(
            spark, catalog, tables,
            OptimizerConfig(enable_data_induced=True, runtime="none"),
        )
        plan = raven.optimize(
            query, partition_sample=frame,
            num_cols=spec.num_cols, cat_cols=spec.cat_cols,
        )
        assert plan.partition_models is not None
        assert len(plan.partition_models.models) == 6
        opt = _collect(raven.execute_plan(plan))
        base = _collect(
            _session(spark, catalog, tables, OptimizerConfig.no_opt()).execute(
                dataset_query(spec, p, tables)
            )
        )
        np.testing.assert_array_equal(
            opt["prediction"].to_numpy(), base["prediction"].to_numpy()
        )


class TestJoinDatasets:
    @pytest.mark.parametrize("name", ["expedia", "flights"])
    def test_optimized_equals_noopt_with_joins(self, spark, name):
        spec = ds.get_spec(name)
        tables = ds.generate(name, 1500, seed=41)
        catalog = spark_exec.register_pandas_tables(spark, tables)
        frame = ds.joined_frame(name, 1500, seed=41)
        p = _pipeline(spec, frame, "dt", max_depth=4)
        query = dataset_query(spec, p, tables)
        base = _collect(
            _session(spark, catalog, tables, OptimizerConfig.no_opt()).execute(query)
        )
        raven = _session(
            spark, catalog, tables, OptimizerConfig(runtime="auto", strategy=None)
        )
        plan = raven.optimize(query)
        opt = _collect(raven.execute_plan(plan))
        np.testing.assert_array_equal(
            base["prediction"].to_numpy(), opt["prediction"].to_numpy()
        )

    def test_join_elimination_on_shallow_model(self, spark):
        """A depth-2 tree cannot touch most dim columns -> at least one
        3-way-join dim must be eliminated (§4.1: "avoid those joins")."""
        spec = ds.get_spec("expedia")
        tables = ds.generate("expedia", 1500, seed=43)
        catalog = spark_exec.register_pandas_tables(spark, tables)
        frame = ds.joined_frame("expedia", 1500, seed=43)
        p = _pipeline(spec, frame, "dt", max_depth=2)
        query = dataset_query(spec, p, tables)
        raven = _session(spark, catalog, tables, OptimizerConfig(runtime="none"))
        plan = raven.optimize(query)
        assert len(plan.eliminated_joins) >= 1
        # result still correct
        out = _collect(raven.execute_plan(plan))
        base = _collect(
            _session(spark, catalog, tables, OptimizerConfig.no_opt()).execute(query)
        )
        np.testing.assert_array_equal(
            out["prediction"].to_numpy(), base["prediction"].to_numpy()
        )


class TestParser:
    @pytest.fixture(scope="class")
    def env(self, spark):
        spec = ds.get_spec("hospital")
        tables = ds.generate("hospital", 1000, seed=51)
        catalog = spark_exec.register_pandas_tables(spark, tables)
        frame = ds.joined_frame("hospital", 1000, seed=51)
        sess = _session(spark, catalog, tables, OptimizerConfig(runtime="none"))
        sess.register_model("hosp_dt", _pipeline(spec, frame, "dt", max_depth=6))
        return sess, frame

    def test_basic_select_predict(self, env):
        sess, frame = env
        out = sess.sql(
            "SELECT PREDICT(hosp_dt, *) AS prediction FROM hospital"
        ).toPandas()
        assert len(out) == len(frame)
        assert {"prediction", "score"} <= set(out.columns)

    def test_where_clause(self, env):
        sess, frame = env
        out = sess.sql(
            "SELECT PREDICT(hosp_dt, *) AS prediction FROM hospital "
            "WHERE asthma = '1' AND bmi > 25.0"
        ).toPandas()
        expected = frame[(frame.asthma == "1") & (frame.bmi > 25.0)]
        assert len(out) == len(expected)

    def test_output_predicate(self, env):
        sess, frame = env
        out = sess.sql(
            "SELECT PREDICT(hosp_dt, *) AS prediction FROM hospital "
            "WHERE prediction = 1"
        ).toPandas()
        assert (out["prediction"] == 1).all()

    def test_join_syntax(self, spark):
        spec = ds.get_spec("expedia")
        tables = ds.generate("expedia", 800, seed=52)
        catalog = spark_exec.register_pandas_tables(spark, tables)
        frame = ds.joined_frame("expedia", 800, seed=52)
        sess = _session(spark, catalog, tables, OptimizerConfig(runtime="none"))
        sess.register_model("exp_dt", _pipeline(spec, frame, "dt", max_depth=3))
        out = sess.sql(
            "SELECT PREDICT(exp_dt, *) AS prediction FROM searches "
            "JOIN hotels ON searches.prop_id = hotels.prop_id "
            "JOIN destinations ON searches.dest_id = destinations.dest_id"
        ).toPandas()
        assert len(out) == len(frame)

    @pytest.mark.parametrize(
        "bad",
        [
            "SELECT PREDICT(nope, *) FROM hospital",
            "SELECT PREDICT(hosp_dt, *) FROM missing_table",
            "SELECT PREDICT(hosp_dt, *) FROM hospital WHERE bmi LIKE 3",
            "SELECT PREDICT(hosp_dt, *) FROM hospital trailing junk",
        ],
    )
    def test_rejects_invalid(self, env, bad):
        sess, _ = env
        with pytest.raises(ValueError):
            sess.sql(bad)
