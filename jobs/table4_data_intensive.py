#!/usr/bin/env python
"""Reproduce paper Table 4: runtime of data-intensive algorithms (L2SVM,
MLogreg, GLM, KMeans) across dense and real-like datasets, single node,
for Base / Fused / Gen / Gen-FA / Gen-FNR."""
import sys

from repro.experiments import format_rows, table4_rows


def main() -> int:
    rows = table4_rows()
    print("Table 4: Runtime of Data-Intensive Algorithms [s] (single node)")
    print(format_rows(rows, ["algorithm", "data", "Base", "Fused", "Gen", "FA", "FNR"]))
    return 0


if __name__ == "__main__":
    sys.exit(main())
