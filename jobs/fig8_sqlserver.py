#!/usr/bin/env python
"""Fig 8: 'SQL Server' (DuckDB) + MADlib-style baseline (no Spark needed)."""
from repro.experiments import fig8

if __name__ == "__main__":
    fig8.run()
