"""Evaluation harness: datasets, queries, metrics, experiment runners."""
from .metrics import f1_score, mean, precision, recall  # noqa: F401
from .datasets import ALL_PARAMS, DATASET_PARAMS, PAPER_NAME, PAPER_TABLE3, load  # noqa: F401
from .queries import community_query_pairs, degree_threshold  # noqa: F401
from .experiments import (  # noqa: F401
    ALL_METHODS,
    BCC_METHODS,
    run_breakdown,
    run_mbcc,
    run_param_sweep,
    run_quality_efficiency,
)
from .tables import markdown_table, table4_markdown  # noqa: F401
