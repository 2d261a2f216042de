#!/usr/bin/env python
"""spark-submit entry point reproducing paper Table XIII: temporal-state
ablation (Max vs Avg)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, RESULTS_DIR, config_from, emit, get_spark, make_parser

from repro.harness.reporting import save_table
from repro.harness.tables import table_ablation


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = get_spark("table13")
    df = table_ablation(spark, config_from(args), policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN)
    emit(df, "table13", "Table XIII: ablation (Max vs Avg)", metrics=())
    wide = df.pivot_table(index=["scenario", "graph"], columns="label", values="are").reset_index()
    save_table(wide, "table13_are", RESULTS_DIR, title="Table XIII — ARE (%)")


if __name__ == "__main__":
    main()
