#!/usr/bin/env python
"""spark-submit entry point reproducing paper Table III: counting triangles, massive deletion."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, config_from, emit, get_spark, make_parser

from repro.harness.tables import table_main


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = get_spark("table03")
    df = table_main(
        spark, "triangle", "massive", config_from(args),
        policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN,
    )
    emit(df, "table03", "Table III: counting triangles, massive deletion")


if __name__ == "__main__":
    main()
