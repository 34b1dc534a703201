"""spark-submit entrypoint: Table VII: response time vs data volume.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table7_scale.py`` or
``python jobs/table7_scale.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table7_scale

if __name__ == "__main__":
    main(table7_scale, 'Table VII: response time vs data volume')
