"""Experiment harness: benchmark runner (``runner``), loading/storage
measurements (``loading``), peak-RSS sampling (``memory``) and the
per-paper-table reproduction functions (``tables``)."""
