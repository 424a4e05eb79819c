"""Storage substrate: analytical HDD/SSD/EBS models + fs-cache elevator."""
from .device import (
    DEFAULT_CPU,
    DEVICES,
    EBS,
    HDD,
    SSD,
    CpuModel,
    DeviceProfile,
    response_time,
    scan_time,
    write_trace_time,
)
from .elevator import elevator_coalesce

__all__ = [
    "DEFAULT_CPU",
    "DEVICES",
    "EBS",
    "HDD",
    "SSD",
    "CpuModel",
    "DeviceProfile",
    "response_time",
    "scan_time",
    "write_trace_time",
    "elevator_coalesce",
]
