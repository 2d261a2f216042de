#!/usr/bin/env python
"""spark-submit entry point reproducing paper Tables V and XII:
transferability of the learned policy across categories."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, config_from, emit, get_spark, make_parser

from repro.harness.tables import table_transfer


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = get_spark("transfer")
    cfg = config_from(args)
    for name, scenario, roman in (("table05", "massive", "V"), ("table12", "light", "XII")):
        df = table_transfer(spark, scenario, cfg, policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN)
        emit(df, name, f"Table {roman}: transferability ({scenario})", metrics=("are",))


if __name__ == "__main__":
    main()
