"""Disk substrate: block store on the local filesystem + I/O cost model."""
