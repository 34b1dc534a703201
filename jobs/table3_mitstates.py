"""spark-submit entrypoint: Table III: accuracy on MIT-States (lite).

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table3_mitstates.py`` or
``python jobs/table3_mitstates.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table3_mitstates

if __name__ == "__main__":
    main(table3_mitstates, 'Table III: accuracy on MIT-States (lite)')
