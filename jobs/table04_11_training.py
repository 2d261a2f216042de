#!/usr/bin/env python
"""Entry point reproducing paper Tables IV and XI: WSD-L training times."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import JOB_TRAIN, POLICY_DIR, emit, make_parser

from repro.harness.tables import table_training


def main() -> None:
    make_parser(__doc__).parse_args()
    for name, scenario, roman in (("table04", "massive", "IV"), ("table11", "light", "XI")):
        df = table_training(scenario, policy_dir=POLICY_DIR, train_cfg=JOB_TRAIN)
        emit(df, name, f"Table {roman}: training time ({scenario} deletion)", metrics=())


if __name__ == "__main__":
    main()
