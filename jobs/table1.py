#!/usr/bin/env python
"""Regenerate Table 1 (theoretical RF upper bounds on power-law graphs)."""
from repro.tables.fmt import render
from repro.tables.table1 import table1_rows


def main() -> None:
    print(render(table1_rows(), title="Table 1 — theoretical UB of RF, |P|=256"))


if __name__ == "__main__":
    main()
