"""Core configuration and schema definitions for the OpenBG reproduction."""
