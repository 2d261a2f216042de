#!/usr/bin/env python
"""spark-submit entry point reproducing paper Table VI: insertion-only
scenario, triangles on cit-PT."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, config_from, emit, get_spark, make_parser

from repro.harness.tables import table_insertion_only


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = get_spark("table06")
    df = table_insertion_only(
        spark, config_from(args), policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN
    )
    emit(df, "table06", "Table VI: insertion-only, triangles on cit-PT")


if __name__ == "__main__":
    main()
