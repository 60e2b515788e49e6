"""Benchmark target regenerating Fig 7 (data scalability)."""


def test_fig7_scalability(benchmark, spark, capsys):
    from repro.experiments import fig7

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig7.run(spark, sizes=(25_000, 100_000, 400_000), runs=3),
        rounds=1, iterations=1,
    )
    # paper shape: Raven >= no-opt at every size for both models
    for r in rows:
        assert r["speedup"] > 0.5
    lr_big = [r for r in rows if r["model"] == "lr"][-1]
    assert lr_big["speedup"] > 1.2
