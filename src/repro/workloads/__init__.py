"""The paper's evaluated workloads: §6.1 one-liners, §6.2 Unix50 subset,
§6.3 NOAA weather analysis, §6.4 Wikipedia-style web indexing, §6.5
micro-benchmarks — as script strings plus deterministic input generators
(DESIGN.md §5 documents each data substitution)."""
from .inputs import (
    bio_reads,
    html_page,
    noaa_env,
    script_files_env,
    spell_dict,
    text_corpus,
)
from .oneliners import ONELINERS, Workload
from .unix50 import UNIX50
from .harness import measure_seq, measure_spark, run_both

__all__ = [
    "ONELINERS", "UNIX50", "Workload", "text_corpus", "spell_dict",
    "noaa_env", "script_files_env", "html_page", "bio_reads",
    "measure_seq", "measure_spark", "run_both",
]
