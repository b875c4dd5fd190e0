"""Evaluation substrate: metrics (AUC/ACC/CorS/AEEC) and the Dataset-M
link-prediction dataset builder with A/B/C sub-sampling."""
from repro.eval.datasets import LinkDataset, build_dataset_m, sample_subdataset
from repro.eval.metrics import aeec, auc, relation_acc_cors

__all__ = [
    "LinkDataset",
    "build_dataset_m",
    "sample_subdataset",
    "auc",
    "aeec",
    "relation_acc_cors",
]
