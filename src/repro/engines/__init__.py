"""Disk-based walk engines: GraSorw bi-block, PB, SOGW, SGSC, first-order."""
