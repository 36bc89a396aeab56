"""Status component: polls task progress and serves stored results."""
from __future__ import annotations

import pandas as pd

from repro.platform.datastore import Datastore
from repro.platform.scheduler import Scheduler, TaskState


class Status:
    """Read-only view over scheduler state and the datastore."""

    def __init__(self, scheduler: Scheduler, datastore: Datastore) -> None:
        self.scheduler = scheduler
        self.datastore = datastore

    def poll(self, tid: str) -> dict:
        """One status snapshot for a task id.

        Returns a dict with ``state`` (str or ``"unknown"``),
        ``has_result`` and, when failed, ``error``.
        """
        state = self.scheduler.state(tid)
        out = {
            "task_id": tid,
            "state": state.value if state else "unknown",
            "has_result": self.datastore.has_result(tid),
        }
        if state is TaskState.FAILED:
            out["error"] = self.scheduler.error(tid)
        return out

    def result(self, tid: str) -> pd.DataFrame:
        """The stored result for a completed task (raises if absent)."""
        return self.datastore.load_result(tid)

    def logs(self, tid: str) -> list[dict]:
        """Structured log events for a task."""
        return self.datastore.read_logs(tid)
