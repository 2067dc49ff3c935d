"""Disk layout and analytical I/O cost model for the disk-based evaluation."""
