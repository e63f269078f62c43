#!/usr/bin/env python
"""Regenerate Table 2 (dataset inventory: paper graphs vs _lite substitutes)."""
from repro.session import build_session
from repro.tables.fmt import render
from repro.tables.table2 import table2_rows


def main() -> None:
    spark = build_session("table2")
    print(render(table2_rows(spark), title="Table 2 — datasets"))
    spark.stop()


if __name__ == "__main__":
    main()
