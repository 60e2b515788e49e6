"""Benchmark target regenerating Fig 8 ('SQL Server' + MADlib)."""
import numpy as np


def test_fig8_sqlserver(benchmark, capsys):
    from repro.experiments import fig8

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig8.run(scale=0.5, runs=3), rounds=1, iterations=1
    )
    # paper shape: biggest wins where MLtoSQL fires (LR/DT); MADlib slowest
    sql_rows = [r for r in rows if r["raven_choice"] == "sql"]
    assert sql_rows, "MLtoSQL never selected"
    assert max(r["speedup_dop16"] for r in sql_rows) > 2.0
    madlib = [r for r in rows if np.isfinite(r["madlib"])]
    assert madlib and all(r["speedup_vs_madlib_dop1"] > 1.0 for r in madlib)
