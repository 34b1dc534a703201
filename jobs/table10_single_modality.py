"""spark-submit entrypoint: Table X/XIX/XX: single query modality.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table10_single_modality.py`` or
``python jobs/table10_single_modality.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table10_single_modality

if __name__ == "__main__":
    main(table10_single_modality, 'Table X/XIX/XX: single query modality')
