"""Datastore: datasets, results and logs on the local filesystem.

The paper's Datastore "is responsible for storing and managing
datasets [and] provides storage for results and logs". Here:

- datasets are stored as two parquet directories (``vertices/``,
  ``edges/``) written and read with Spark (datasets can be large);
- results are small top-k frames, stored as single parquet files via
  pandas/pyarrow;
- logs are JSONL, append-only, one file per task.
"""
from __future__ import annotations

import json
import os

import pandas as pd
from pyspark.sql import SparkSession

from repro.graph.graph import DiGraph


class Datastore:
    """Filesystem-backed storage rooted at ``root``."""

    def __init__(self, root: str) -> None:
        self.root = root
        for sub in ("datasets", "results", "logs"):
            os.makedirs(os.path.join(root, sub), exist_ok=True)

    # -- datasets -------------------------------------------------------

    def _dataset_dir(self, name: str) -> str:
        return os.path.join(self.root, "datasets", name)

    def save_dataset(self, name: str, g: DiGraph) -> None:
        """Persist a graph as vertices+edges parquet."""
        d = self._dataset_dir(name)
        g.vertices.write.mode("overwrite").parquet(os.path.join(d, "vertices"))
        g.edges.write.mode("overwrite").parquet(os.path.join(d, "edges"))

    def load_dataset(self, spark: SparkSession, name: str) -> DiGraph:
        """Load a persisted graph.

        Raises:
            FileNotFoundError: if the dataset was never saved.
        """
        d = self._dataset_dir(name)
        if not os.path.isdir(d):
            raise FileNotFoundError(f"dataset {name!r} not in datastore")
        return DiGraph(
            vertices=spark.read.parquet(os.path.join(d, "vertices")),
            edges=spark.read.parquet(os.path.join(d, "edges")),
        )

    def has_dataset(self, name: str) -> bool:
        """Whether a dataset with this name is stored."""
        return os.path.isdir(self._dataset_dir(name))

    def list_stored_datasets(self) -> list[str]:
        """Names of all stored datasets, sorted."""
        return sorted(os.listdir(os.path.join(self.root, "datasets")))

    # -- results --------------------------------------------------------

    def _result_path(self, tid: str) -> str:
        return os.path.join(self.root, "results", f"{tid}.parquet")

    def save_result(self, tid: str, result: pd.DataFrame) -> None:
        """Persist a (small) result frame for a task id."""
        result.to_parquet(self._result_path(tid), index=False)

    def load_result(self, tid: str) -> pd.DataFrame:
        """Load a task's result.

        Raises:
            FileNotFoundError: if no result exists for ``tid``.
        """
        p = self._result_path(tid)
        if not os.path.exists(p):
            raise FileNotFoundError(f"no result for task {tid!r}")
        return pd.read_parquet(p)

    def has_result(self, tid: str) -> bool:
        """Whether a result is stored for ``tid``."""
        return os.path.exists(self._result_path(tid))

    # -- logs -----------------------------------------------------------

    def append_log(self, tid: str, event: str, **fields) -> None:
        """Append one structured log event for a task."""
        p = os.path.join(self.root, "logs", f"{tid}.jsonl")
        with open(p, "a", encoding="utf-8") as fh:
            fh.write(json.dumps({"event": event, **fields}, sort_keys=True) + "\n")

    def read_logs(self, tid: str) -> list[dict]:
        """All log events for a task (empty if none)."""
        p = os.path.join(self.root, "logs", f"{tid}.jsonl")
        if not os.path.exists(p):
            return []
        with open(p, encoding="utf-8") as fh:
            return [json.loads(line) for line in fh if line.strip()]
