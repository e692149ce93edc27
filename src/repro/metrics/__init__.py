"""Subpackage of the MRPG reproduction."""
