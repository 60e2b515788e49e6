"""Benchmark target regenerating Fig 10 (+ §7.2.2 data predicates)."""


def test_fig10_dt_depth(benchmark, spark, capsys):
    from repro.experiments import fig10

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig10.run(spark, n_rows=150_000, runs=3, depths=(3, 8, 20)),
        rounds=1, iterations=1,
    )
    by = {r["depth"]: r for r in rows}
    # paper shape: MLtoSQL speedup decays with depth; unused cols shrink
    assert by[3]["mltosql_speedup"] > by[20]["mltosql_speedup"]
    assert by[3]["unused_cols"] >= by[20]["unused_cols"]


def test_fig10_data_predicates(benchmark, spark, capsys):
    from repro.experiments import fig10

    with capsys.disabled():
        res = benchmark.pedantic(
        lambda: fig10.run_predicate_experiment(spark, n_rows=150_000, runs=3),
        rounds=1, iterations=1,
    )
    assert res["pruned_inputs"] >= 0
    assert res["pred_prune+modelproj"] <= res["noopt"] * 1.25
