"""Benchmark target regenerating Fig 11 (data-induced, partitioned)."""


def test_fig11_data_induced(benchmark, spark, capsys):
    from repro.experiments import fig11

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig11.run(spark, n_rows=150_000, runs=3, depths=(10, 20)),
        rounds=1, iterations=1,
    )
    # paper shape: partition-specialized models never lose to no-opt
    for r in rows:
        assert r["best_part_speedup"] > 0.85
