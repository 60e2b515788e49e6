"""Benchmark target regenerating Fig 12 (MLtoDNN; GPU column modeled)."""


def test_fig12_mltodnn(benchmark, spark, capsys):
    from repro.experiments import fig12

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig12.run(
            spark, n_rows=100_000, runs=3, configs=((60, 4), (300, 8))
        ),
        rounds=1, iterations=1,
    )
    # paper shape: modeled-GPU speedup grows with model complexity
    assert rows[-1]["gpu_speedup_modeled"] > rows[0]["gpu_speedup_modeled"]
    assert rows[-1]["gpu_speedup_modeled"] > 1.2
