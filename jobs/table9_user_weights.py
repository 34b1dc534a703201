"""spark-submit entrypoint: Table IX: user-defined weights.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table9_user_weights.py`` or
``python jobs/table9_user_weights.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table9_user_weights

if __name__ == "__main__":
    main(table9_user_weights, 'Table IX: user-defined weights')
