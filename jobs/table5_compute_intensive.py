#!/usr/bin/env python
"""Reproduce paper Table 5: runtime of compute-intensive algorithms
(ALS-CG on sparse/ultra-sparse data with N/A for non-sparsity-exploiting
modes; AutoEncoder on dense data)."""
import sys

from repro.experiments import format_rows, table5_rows


def main() -> int:
    rows = table5_rows()
    print("Table 5: Runtime of Compute-Intensive Algorithms [s]")
    print(format_rows(rows, ["algorithm", "data", "Base", "Fused", "Gen", "FA", "FNR"]))
    return 0


if __name__ == "__main__":
    sys.exit(main())
