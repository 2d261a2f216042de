#!/usr/bin/env python
"""spark-submit entry point reproducing paper Table I: dataset statistics."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import config_from, emit, make_parser

from repro.harness.tables import dataset_stats


def main() -> None:
    args = make_parser(__doc__).parse_args()
    emit(dataset_stats(config_from(args)), "table01", "Table I: dataset statistics", metrics=())


if __name__ == "__main__":
    main()
