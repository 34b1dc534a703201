"""spark-submit entrypoint: Table VI: accuracy on MS-COCO (lite).

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table6_mscoco.py`` or
``python jobs/table6_mscoco.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table6_mscoco

if __name__ == "__main__":
    main(table6_mscoco, 'Table VI: accuracy on MS-COCO (lite)')
