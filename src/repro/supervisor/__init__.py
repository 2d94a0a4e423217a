"""Supervisor (paper §4.1.1): triggering policies + pipeline orchestration."""
from repro.supervisor.supervisor import Supervisor
from repro.supervisor.triggers import DataAmountTrigger, TimeTrigger, Trigger

__all__ = ["Supervisor", "Trigger", "DataAmountTrigger", "TimeTrigger"]
