"""spark-submit entrypoint: Table VIII: recall vs #modalities.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table8_modalities.py`` or
``python jobs/table8_modalities.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table8_modalities

if __name__ == "__main__":
    main(table8_modalities, 'Table VIII: recall vs #modalities')
