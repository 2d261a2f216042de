#!/usr/bin/env python
"""spark-submit entry point reproducing paper Table X: counting 4-cliques, light deletion."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, config_from, emit, get_spark, make_parser

from repro.harness.tables import table_main


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = get_spark("table10")
    df = table_main(
        spark, "4clique", "light", config_from(args).with_(m_ratio=0.15, mare_floor=10.0),
        policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN,
    )
    emit(df, "table10", "Table X: counting 4-cliques, light deletion")


if __name__ == "__main__":
    main()
